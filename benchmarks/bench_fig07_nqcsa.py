"""Figure 7 — CV saturation fixing N_QCSA = 30."""
from benchmarks._util import save
from repro.experiments import fig07_nqcsa


def test_fig07(benchmark):
    df = benchmark.pedantic(fig07_nqcsa.run, rounds=1, iterations=1)
    save("fig07_nqcsa", df)
    assert df.n_samples.max() == 50
