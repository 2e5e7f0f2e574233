"""Shared helpers for the experiment harnesses.

Every experiment module exposes ``run(...) -> pandas.DataFrame`` whose
rows mirror the corresponding paper table/figure, plus a ``PAPER``
constant holding the numbers the paper reports, so EXPERIMENTS.md can
diff them side by side. The harnesses default to the four-node ARM
simulated cluster (the paper's primary platform) at 300 GB (the
Figures 11/12 setting).
"""
from __future__ import annotations

import pandas as pd

from repro.baselines import DAC, GBORL, QTune, Tuneful
from repro.cluster.hardware import ARM_CLUSTER, X86_CLUSTER, ClusterSpec
from repro.core.configspace import ConfigSpace, arm_space, x86_space
from repro.core.locat import Locat
from repro.execmodel.sim_exec import make_executor

__all__ = [
    "BENCHMARKS",
    "DATA_SIZES_GB",
    "SOTA",
    "cluster_for",
    "space_for",
    "make_tuner",
    "run_campaign",
]

#: Table 1's five benchmarks and data sizes.
BENCHMARKS = ("TPC-DS", "TPC-H", "Join", "Scan", "Aggregation")
DATA_SIZES_GB = (100.0, 200.0, 300.0, 400.0, 500.0)
SOTA = ("Tuneful", "DAC", "GBO-RL", "QTune")


def cluster_for(name: str) -> ClusterSpec:
    return {"arm": ARM_CLUSTER, "x86": X86_CLUSTER}[name]


def space_for(name: str) -> ConfigSpace:
    return {"arm": arm_space(), "x86": x86_space()}[name]


def make_tuner(name: str, space: ConfigSpace, seed: int, queries=None, **kw):
    """Instantiate a tuner by its paper name."""
    cls = {
        "LOCAT": Locat,
        "Tuneful": Tuneful,
        "DAC": DAC,
        "GBO-RL": GBORL,
        "QTune": QTune,
    }[name]
    if name == "LOCAT":
        return cls(space, seed=seed, **kw)
    return cls(space, seed=seed, queries=queries, **kw)


def run_campaign(
    tuner_name: str,
    benchmark: str,
    cluster: str,
    ds,
    *,
    seed: int = 5,
    exec_seed: int = 3,
    **tuner_kw,
):
    """One tuning campaign; returns TuneResult (single ds) or dict (list)."""
    space = space_for(cluster)
    ex = make_executor(benchmark, cluster_for(cluster), seed=exec_seed)
    tuner = make_tuner(tuner_name, space, seed, **tuner_kw)
    if isinstance(ds, (list, tuple)):
        return tuner.tune_multi(ex, list(ds)), ex
    return tuner.tune(ex, float(ds)), ex


def to_markdown(df: pd.DataFrame, floatfmt: str = "%.2f") -> str:
    """Plain-text table without optional tabulate dependency."""
    df = df.copy()
    for c in df.columns:
        if df[c].dtype.kind == "f":
            df[c] = df[c].map(lambda v: floatfmt % v)
    return df.to_string(index=False)
