"""Shared helpers for the benchmark harnesses.

Each bench regenerates one paper table/figure-table, prints it, and
persists it under ``results/`` so EXPERIMENTS.md's paper-vs-measured
diffs can be refreshed from the saved artifacts.

Set ``REPRO_FAST=1`` to shrink the campaign scopes for quick iteration.
"""
from __future__ import annotations

import os
import pathlib

import pandas as pd

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"
FAST = os.environ.get("REPRO_FAST") == "1"


def save(name: str, df: pd.DataFrame, extra: str = "") -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    text = df.to_string(index=False)
    if extra:
        text += "\n\n" + extra
    (RESULTS_DIR / f"{name}.txt").write_text(text + "\n")
    print(f"\n[{name}]\n{text}")
    if extra:
        print(extra)
