"""Figure 12 — optimization-time reduction on the eight-node x86 cluster."""
from benchmarks._util import FAST, save
from repro.experiments import fig11_12_opttime


def test_fig12_x86(benchmark):
    kwargs = {"cluster": "x86"}
    if FAST:
        kwargs["benchmarks"] = ("TPC-H", "Join")
    df = benchmark.pedantic(lambda: fig11_12_opttime.run(**kwargs), rounds=1, iterations=1)
    summary = fig11_12_opttime.summarize(df)
    save("fig12_opttime_x86", df, extra=summary.to_string(index=False))
    assert (df.time_reduction_x > 1).mean() > 0.8
