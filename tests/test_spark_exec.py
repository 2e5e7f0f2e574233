"""Tests for the live-Spark executor and the Spark-side analytics."""
import pandas as pd
import pytest

from repro.core.configspace import arm_space
from repro.core.qcsa import qcsa, qcsa_spark
from repro.core.spearman import spearman, spearman_spark
from repro.execmodel.spark_exec import RUNTIME_TUNABLE, SparkSQLExecutor
from repro.workloads.registry import all_benchmarks

ARM = arm_space()
SF = 0.002


@pytest.fixture(scope="module")
def tpch_exec(spark):
    return SparkSQLExecutor(spark, all_benchmarks()["TPC-H"])


class TestSparkExecutor:
    def test_run_measures_and_charges(self, tpch_exec):
        before = tpch_exec.charged_seconds
        r = tpch_exec.run(ARM.default_conf(), SF)
        assert set(r.times) == set(tpch_exec.query_names)
        assert all(t > 0 for t in r.times.values())
        assert tpch_exec.charged_seconds == pytest.approx(before + r.total)

    def test_evaluate_does_not_charge(self, tpch_exec):
        before = tpch_exec.charged_seconds
        tpch_exec.evaluate(ARM.default_conf(), SF, ["Q06"])
        assert tpch_exec.charged_seconds == before

    def test_query_subset(self, tpch_exec):
        r = tpch_exec.run(ARM.default_conf(), SF, ["Q01", "Q06"])
        assert set(r.times) == {"Q01", "Q06"}

    def test_conf_applied_and_restored(self, spark, tpch_exec):
        key = "spark.sql.shuffle.partitions"
        prev = spark.conf.get(key)
        conf = ARM.complete({key: 7})
        tpch_exec.run(conf, SF, ["Q06"])
        assert spark.conf.get(key) == prev  # restored after the trial

    def test_runtime_tunable_supported_by_spark(self, spark, tpch_exec):
        conf = ARM.default_conf()
        tpch_exec.run(conf, SF, ["Q01"])
        # Spark 4.1 accepts the whole runtime-tunable subset
        assert tpch_exec.unsupported == set()

    def test_different_partitions_still_correct(self, spark, tpch_exec):
        """Results are configuration-independent (oracle check under an
        aggressively tuned configuration)."""
        from repro.oracle import assert_equivalent
        from repro.workloads.registry import register_views

        bm = all_benchmarks()["TPC-H"]
        tables = tpch_exec.tables(SF)
        register_views(spark, tables)
        pdfs = {k: v.toPandas() for k, v in tables.items()}
        conf = ARM.complete({
            "spark.sql.shuffle.partitions": 3,
            "spark.sql.join.preferSortMergeJoin": False,
            "spark.sql.autoBroadcastJoinThreshold": 8192,
            "spark.sql.sort.enableRadixSort": False,
        })
        prev = tpch_exec._apply(conf)
        try:
            q = bm.query("Q05")
            assert_equivalent(spark.sql(q.sql), q.sql, **pdfs)
        finally:
            tpch_exec._restore(prev)

    def test_converters_units(self):
        # Table 2 gives autoBroadcastJoinThreshold in KB; Spark wants bytes
        assert RUNTIME_TUNABLE["spark.sql.autoBroadcastJoinThreshold"](1024) == str(1024 * 1024)
        assert RUNTIME_TUNABLE["spark.sql.join.preferSortMergeJoin"](False) == "false"


class TestSparkAnalytics:
    def test_spearman_spark_matches_numpy(self, spark):
        import numpy as np

        rng = np.random.default_rng(0)
        x = rng.random(60)
        y = 2 * x + 0.2 * rng.standard_normal(60)
        df = spark.createDataFrame(pd.DataFrame({"x": x, "y": y}))
        rho_spark = spearman_spark(df, "x", "y")
        rho_np = spearman(x, y)
        assert rho_spark == pytest.approx(rho_np, abs=1e-9)

    def test_spearman_spark_with_ties(self, spark):
        import numpy as np

        x = np.array([1.0, 2.0, 2.0, 3.0, 3.0, 4.0] * 5)
        y = x**2 + np.tile(np.array([0.0, 0.1, -0.1]), 10)
        df = spark.createDataFrame(pd.DataFrame({"x": x, "y": y}))
        assert spearman_spark(df, "x", "y") == pytest.approx(spearman(x, y), abs=1e-9)

    def test_qcsa_spark_matches_pandas(self, spark):
        rows = []
        for j in range(8):
            rows.append({"query": "flat", "run": j, "time": 5.0 + 0.01 * (j % 2)})
            rows.append({"query": "wild", "run": j, "time": 5.0 * (1 + j)})
        pdf = pd.DataFrame(rows)
        res_pd = qcsa(pdf)
        res_spark = qcsa_spark(spark.createDataFrame(pdf))
        assert set(res_spark.csq) == set(res_pd.csq)
        for q in res_pd.cvs:
            assert res_spark.cvs[q] == pytest.approx(res_pd.cvs[q], rel=1e-9)
