"""Result-correctness tests: every workload query vs the DuckDB oracle.

One test per query of every benchmark. The same SQL text runs on Spark
(over temp views) and DuckDB (over the same pandas frames); sorted rows
must match. This is the guarantee that the executor's trials measure
*correct* executions, not just completed ones.
"""
import pytest

from repro.oracle import assert_equivalent
from repro.workloads.registry import all_benchmarks, register_views

SF = 0.003

_BENCHMARKS = all_benchmarks()
_CASES = [
    (bname, q.name) for bname, bm in _BENCHMARKS.items() for q in bm.queries
]


@pytest.fixture(scope="module")
def table_sets(spark):
    """Generate each benchmark's tables once (Spark DF + pandas copies)."""
    out = {}
    for bname, bm in _BENCHMARKS.items():
        if bname in ("Scan", "Join", "Aggregation") and "hibench" in out:
            out[bname] = out["hibench"]
            continue
        tables = bm.make_tables(spark, SF)
        pdfs = {k: v.toPandas() for k, v in tables.items()}
        entry = (tables, pdfs)
        out[bname] = entry
        if bname in ("Scan", "Join", "Aggregation"):
            out["hibench"] = entry
    return out


@pytest.mark.parametrize("bname,qname", _CASES)
def test_query_matches_duckdb(spark, table_sets, bname, qname):
    tables, pdfs = table_sets[bname]
    register_views(spark, tables)
    q = _BENCHMARKS[bname].query(qname)
    assert_equivalent(spark.sql(q.sql), q.sql, **pdfs)


def test_all_benchmarks_present():
    assert set(_BENCHMARKS) == {"TPC-H", "TPC-DS", "Join", "Scan", "Aggregation"}


def test_query_counts():
    assert len(_BENCHMARKS["TPC-H"].queries) == 10
    assert len(_BENCHMARKS["TPC-DS"].queries) == 12
    for single in ("Join", "Scan", "Aggregation"):
        assert len(_BENCHMARKS[single].queries) == 1


def test_categories_cover_all_three():
    for bname in ("TPC-H", "TPC-DS"):
        cats = {q.category for q in _BENCHMARKS[bname].queries}
        assert cats == {"selection", "join", "aggregation"}


def test_registry_query_lookup():
    bm = _BENCHMARKS["TPC-H"]
    assert bm.query("Q01").category == "aggregation"
    with pytest.raises(KeyError):
        bm.query("nope")
