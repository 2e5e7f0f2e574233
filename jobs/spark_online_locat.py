"""Run LOCAT online against live Spark SQL (TPC-H-lite).

Usage: spark-submit jobs/spark_online_locat.py [--sf 0.01]
"""
import argparse

from _common import get_spark
from repro.core.configspace import arm_space
from repro.core.locat import Locat
from repro.execmodel.spark_exec import SparkSQLExecutor
from repro.workloads.registry import all_benchmarks

if __name__ == "__main__":
    p = argparse.ArgumentParser()
    p.add_argument("--sf", type=float, default=0.01)
    p.add_argument("--benchmark", default="TPC-H")
    args = p.parse_args()
    spark = get_spark("locat-online")
    try:
        space = arm_space()
        ex = SparkSQLExecutor(spark, all_benchmarks()[args.benchmark])
        loc = Locat(space, seed=2, n_qcsa=8, n_iicp=6, min_iters=3, max_iters=6,
                    n_candidates=60, n_hyper=3)
        res = loc.tune(ex, args.sf)
        default_t = ex.evaluate(space.default_conf(), args.sf).total
        print(f"runs={res.n_runs} opt_wallclock={res.opt_seconds:.1f}s "
              f"tuned={res.best_time:.2f}s default={default_t:.2f}s "
              f"speedup_vs_default={default_t / res.best_time:.2f}x")
        print("RQA:", res.extras["qcsa"].csq)
        print("CPS kept:", res.extras["iicp"].cps_result.kept)
    finally:
        spark.stop()
