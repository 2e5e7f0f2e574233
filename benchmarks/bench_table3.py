"""Table 3 — top-5 CPS parameters for TPC-DS at 100 GB / 500 GB / 1 TB."""
from benchmarks._util import FAST, save
from repro.experiments import table3


def test_table3(benchmark):
    n = 60 if FAST else 120
    df = benchmark.pedantic(lambda: table3.run(n_samples=n), rounds=1, iterations=1)
    save("table3", df)
    assert len(df) == 15
