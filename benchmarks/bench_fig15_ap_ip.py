"""Figure 15 — important-parameter tuning (IP) vs all-parameter (AP)."""
from benchmarks._util import FAST, save
from repro.experiments import fig15_ap_ip


def test_fig15(benchmark):
    sizes = (100.0, 300.0) if FAST else (100.0, 200.0, 300.0, 400.0, 500.0)
    df = benchmark.pedantic(lambda: fig15_ap_ip.run(sizes=sizes), rounds=1, iterations=1)
    save("fig15_ap_ip", df, extra="avg ip/ap: %.2f" % df.ip_over_ap_x.mean())
