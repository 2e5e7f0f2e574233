"""Figure 16 — ML performance-model accuracy comparison."""
from benchmarks._util import save
from repro.experiments import fig16_models


def test_fig16(benchmark):
    df = benchmark.pedantic(fig16_models.run, rounds=1, iterations=1)
    pivot = df.pivot(index="benchmark", columns="model", values="rel_error").round(3)
    save("fig16_models", df, extra=pivot.to_string())
    assert df.groupby("model").rel_error.mean().idxmin() == "GBRT"
