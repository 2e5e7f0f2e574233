"""Unit tests for the Table 2 configuration space."""
import numpy as np
import pytest

from repro.core.configspace import TABLE2, ConfigParam, ConfigSpace, arm_space, x86_space

ARM = arm_space()
X86 = x86_space()
NAMES = ARM.names


def test_has_38_parameters():
    assert ARM.dim == 38
    assert X86.dim == 38
    assert len(TABLE2) == 38


def test_numeric_boolean_split_matches_printed_table():
    numeric = [p for p in ARM.params if p.kind != "bool"]
    booleans = [p for p in ARM.params if p.kind == "bool"]
    assert len(numeric) == 27
    assert len(booleans) == 11


def test_resource_parameters_starred():
    starred = {p.name for p in ARM.params if p.resource}
    assert starred == {
        "spark.driver.cores",
        "spark.driver.memory",
        "spark.executor.cores",
        "spark.executor.memory",
        "spark.executor.memoryOverhead",
        "spark.memory.offHeap.size",
    }


@pytest.mark.parametrize("name", NAMES)
def test_normalize_denormalize_roundtrip(name):
    p = ARM[name]
    rng = np.random.default_rng(hash(name) % 2**32)
    for _ in range(5):
        v = p.sample(rng)
        assert p.denormalize(p.normalize(v)) == v


@pytest.mark.parametrize("name", NAMES)
def test_sample_within_range(name):
    p = ARM[name]
    rng = np.random.default_rng(0)
    for _ in range(10):
        v = p.sample(rng)
        if p.kind == "bool":
            assert isinstance(v, bool)
        else:
            assert p.lo <= v <= p.hi


@pytest.mark.parametrize("name", NAMES)
def test_clip_respects_bounds(name):
    p = ARM[name]
    if p.kind == "bool":
        assert p.clip(True) is True
    else:
        assert p.clip(p.lo - 1e9) == (int(p.lo) if p.kind == "int" else p.lo)
        assert p.clip(p.hi + 1e9) == (int(p.hi) if p.kind == "int" else p.hi)


@pytest.mark.parametrize("name", NAMES)
def test_x86_ranges_differ_only_where_table2_says(name):
    pa, pb = ARM[name], X86[name]
    wider_on_x86 = {
        "spark.driver.cores",
        "spark.driver.memory",
        "spark.executor.cores",
        "spark.executor.memory",
        "spark.executor.memoryOverhead",
        "spark.memory.offHeap.size",
    }
    if name == "spark.executor.instances":
        assert (pa.lo, pa.hi) == (48, 384)
        assert (pb.lo, pb.hi) == (9, 112)
    elif name in wider_on_x86:
        assert pb.hi >= pa.hi
    else:
        assert (pa.lo, pa.hi, pa.kind) == (pb.lo, pb.hi, pb.kind)


def test_specific_table2_rows():
    p = ARM["spark.sql.shuffle.partitions"]
    assert (p.default, p.lo, p.hi) == (200, 100, 1000)
    p = ARM["spark.memory.fraction"]
    assert p.kind == "float" and (p.lo, p.hi) == (0.5, 0.9)
    p = ARM["spark.executor.memoryOverhead"]
    assert (p.default, p.lo, p.hi) == (384, 0, 32768)
    assert X86["spark.executor.memoryOverhead"].hi == 49152


def test_default_conf_is_range_clipped():
    conf = ARM.default_conf()
    for p in ARM.params:
        if p.kind != "bool":
            assert p.lo <= conf[p.name] <= p.hi
    # Spark's out-of-range defaults clip to the range edge
    assert conf["spark.executor.instances"] == 48
    assert conf["spark.executor.memory"] == 4


def test_vector_roundtrip():
    rng = np.random.default_rng(1)
    conf = ARM.sample_random(rng)
    v = ARM.to_vector(conf)
    assert v.shape == (38,)
    assert np.all((v >= 0) & (v <= 1))
    assert ARM.from_vector(v) == conf


def test_from_vector_shape_check():
    with pytest.raises(ValueError):
        ARM.from_vector(np.zeros(5))


def test_matrix_stacks():
    rng = np.random.default_rng(2)
    confs = [ARM.sample_random(rng) for _ in range(4)]
    m = ARM.matrix(confs)
    assert m.shape == (4, 38)


def test_subspace_preserves_order_and_rejects_unknown():
    sub = ARM.subspace(["spark.executor.memory", "spark.sql.shuffle.partitions"])
    assert sub.names == ["spark.executor.memory", "spark.sql.shuffle.partitions"]
    with pytest.raises(KeyError):
        ARM.subspace(["nope"])


def test_complete_fills_defaults_and_clips():
    conf = ARM.complete({"spark.sql.shuffle.partitions": 5000})
    assert conf["spark.sql.shuffle.partitions"] == 1000  # clipped to hi
    assert conf["spark.executor.memory"] == 4
    with pytest.raises(KeyError):
        ARM.complete({"bogus": 1})


def test_lhs_sampling_produces_valid_confs():
    rng = np.random.default_rng(3)
    confs = ARM.sample_lhs(5, rng)
    assert len(confs) == 5
    for c in confs:
        v = ARM.to_vector(c)
        assert np.all((v >= -1e-9) & (v <= 1 + 1e-9))


def test_duplicate_names_rejected():
    p = ConfigParam("x", "int", 1, 0, 10)
    with pytest.raises(ValueError):
        ConfigSpace([p, p])


def test_bad_param_definitions_rejected():
    with pytest.raises(ValueError):
        ConfigParam("x", "weird", 1, 0, 10)
    with pytest.raises(ValueError):
        ConfigParam("x", "int", 1, 10, 10)
