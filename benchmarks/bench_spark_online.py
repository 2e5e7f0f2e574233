"""Online LOCAT on live Spark SQL — the real-metrics tuning path.

TPC-H-lite at SF 0.01 (larger than the unit tests' 0.002 so shuffles are
real work), small tuning budget. Reported: per-phase costs and the tuned
vs default execution time on real Spark.
"""
import pandas as pd
from benchmarks._util import FAST, save

from repro.core.configspace import arm_space
from repro.core.locat import Locat
from repro.execmodel.spark_exec import SparkSQLExecutor
from repro.workloads.registry import all_benchmarks

SF = 0.005 if FAST else 0.01


def test_spark_online_locat(benchmark, spark):
    space = arm_space()
    ex = SparkSQLExecutor(spark, all_benchmarks()["TPC-H"])
    ex.tables(SF)  # generate data outside the timed region

    def tune():
        loc = Locat(space, seed=2, n_qcsa=8, n_iicp=6, min_iters=3, max_iters=5,
                    n_candidates=60, n_hyper=3)
        return loc.tune(ex, SF)

    res = benchmark.pedantic(tune, rounds=1, iterations=1)
    default_t = ex.evaluate(space.default_conf(), SF).total
    tuned_t = ex.evaluate(res.best_conf, SF).total
    df = pd.DataFrame(
        [
            {
                "sf": SF,
                "n_runs": res.n_runs,
                "opt_wallclock_s": res.opt_seconds,
                "rqa_queries": len(res.extras["qcsa"].csq),
                "cps_kept": len(res.extras["iicp"].cps_result.kept),
                "default_exec_s": default_t,
                "tuned_exec_s": tuned_t,
                "tuned_over_default_x": default_t / tuned_t,
            }
        ]
    )
    save("spark_online_locat", df)
    assert res.n_runs >= 8
