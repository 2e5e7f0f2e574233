"""Figure 20 — tuning overhead growth with data size."""
from benchmarks._util import FAST, save
from repro.experiments import fig20_overhead


def test_fig20(benchmark):
    sizes = (100.0, 300.0) if FAST else (100.0, 200.0, 300.0, 400.0, 500.0)
    df = benchmark.pedantic(lambda: fig20_overhead.run(sizes=sizes), rounds=1, iterations=1)
    save("fig20_overhead", df)
    locat = df[df.tuner == "LOCAT"].cumulative_opt_h.max()
    others = df[df.tuner != "LOCAT"].groupby("tuner").cumulative_opt_h.max()
    assert (others > locat).all()
