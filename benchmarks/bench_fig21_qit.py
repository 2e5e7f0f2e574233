"""Figure 21 — QCSA/IICP grafted onto the SOTA approaches."""
from benchmarks._util import FAST, save
from repro.experiments import fig21_qit


def test_fig21(benchmark):
    tuners = ("DAGP", "Tuneful") if FAST else ("DAGP", "Tuneful", "DAC", "GBO-RL", "QTune")
    df = benchmark.pedantic(lambda: fig21_qit.run(tuners=tuners), rounds=1, iterations=1)
    save("fig21_qit", df)
