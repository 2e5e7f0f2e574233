"""Shared tuning-outcome record.

Every tuner in this reproduction — LOCAT and the four SOTA baselines —
returns a :class:`TuneResult` so the experiment harnesses can compare
them uniformly on the paper's two axes: the quality of the found
configuration (execution time → Figures 13/14 speedups) and the
optimization time spent finding it (→ Figures 11/12/20).
"""
from __future__ import annotations

from dataclasses import dataclass, field

__all__ = ["TuneResult"]


@dataclass
class TuneResult:
    """Outcome of one tuning campaign at one input data size."""

    tuner: str
    best_conf: dict
    best_time: float  # noise-free execution time of the tuned configuration
    opt_seconds: float  # charged cluster time spent optimizing
    n_runs: int  # application executions performed
    ds: float
    extras: dict = field(default_factory=dict)
