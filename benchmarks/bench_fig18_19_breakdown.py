"""Figures 18 & 19 — CSQ/CIQ split and GC-time breakdown."""
from benchmarks._util import FAST, save
from repro.experiments import fig18_19_breakdown


def test_fig18(benchmark):
    sizes = (100.0, 300.0) if FAST else (100.0, 300.0, 500.0)
    df = benchmark.pedantic(lambda: fig18_19_breakdown.run_fig18(sizes=sizes), rounds=1, iterations=1)
    save("fig18_csq_ciq", df)


def test_fig19(benchmark):
    sizes = (100.0, 300.0) if FAST else (100.0, 300.0, 500.0)
    df = benchmark.pedantic(lambda: fig18_19_breakdown.run_fig19(sizes=sizes), rounds=1, iterations=1)
    save("fig19_gc_time", df)
