"""Figure 6 — CPE kernel comparison (gaussian vs perceptron vs polynomial)."""
from benchmarks._util import save
from repro.experiments import fig06_kernels


def test_fig06(benchmark):
    df = benchmark.pedantic(fig06_kernels.run, rounds=1, iterations=1)
    save("fig06_kernels", df)
    assert set(df.kernel) == {"gaussian", "polynomial", "perceptron"}
