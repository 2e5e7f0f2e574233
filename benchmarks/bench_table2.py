"""Table 2 — the 38 configuration parameters with both clusters' ranges."""
from benchmarks._util import save
from repro.experiments import table2


def test_table2(benchmark):
    df = benchmark.pedantic(table2.run, rounds=1, iterations=1)
    save("table2", df)
    assert len(df) == 38
