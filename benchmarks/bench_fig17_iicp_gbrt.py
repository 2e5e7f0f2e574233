"""Figure 17 — IICP vs GBRT importance selection."""
from benchmarks._util import save
from repro.experiments import fig17_iicp_gbrt


def test_fig17(benchmark):
    df = benchmark.pedantic(fig17_iicp_gbrt.run, rounds=1, iterations=1)
    save("fig17_iicp_gbrt", df)
