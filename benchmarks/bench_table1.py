"""Table 1 — benchmarks x input data sizes."""
from benchmarks._util import save
from repro.experiments import table1


def test_table1(benchmark):
    df = benchmark.pedantic(table1.run, rounds=1, iterations=1)
    save("table1", df)
    assert len(df) == 5
