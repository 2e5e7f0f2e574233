"""Figure 13 — speedups over SOTA-tuned configurations, ARM cluster."""
from benchmarks._util import FAST, save
from repro.experiments import fig13_14_speedup


def test_fig13_arm(benchmark):
    kwargs = {"cluster": "arm", "sizes": (100.0, 300.0, 500.0)}
    if FAST:
        kwargs["benchmarks"] = ("TPC-H",)
    df = benchmark.pedantic(lambda: fig13_14_speedup.run(**kwargs), rounds=1, iterations=1)
    summary = fig13_14_speedup.summarize(df)
    save("fig13_speedup_arm", df, extra=summary.to_string(index=False))
