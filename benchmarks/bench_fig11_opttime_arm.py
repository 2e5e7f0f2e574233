"""Figure 11 — optimization-time reduction on the four-node ARM cluster."""
from benchmarks._util import FAST, save
from repro.experiments import fig11_12_opttime


def test_fig11_arm(benchmark):
    kwargs = {"cluster": "arm"}
    if FAST:
        kwargs["benchmarks"] = ("TPC-H", "Join")
    df = benchmark.pedantic(lambda: fig11_12_opttime.run(**kwargs), rounds=1, iterations=1)
    summary = fig11_12_opttime.summarize(df)
    save("fig11_opttime_arm", df, extra=summary.to_string(index=False))
    assert (df.time_reduction_x > 1).mean() > 0.8
