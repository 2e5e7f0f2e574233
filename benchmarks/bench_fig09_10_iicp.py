"""Figures 9 & 10 — N_IICP determination and CPS/CPE reduction counts."""
from benchmarks._util import save
from repro.experiments import fig09_10_iicp


def test_fig09(benchmark):
    df = benchmark.pedantic(fig09_10_iicp.run_fig9, rounds=1, iterations=1)
    save("fig09_niicp", df)


def test_fig10(benchmark):
    df = benchmark.pedantic(fig09_10_iicp.run_fig10, rounds=1, iterations=1)
    save("fig10_cps_cpe", df)
    assert len(df) == 5
