"""Benchmark helpers: every bench writes its table to results/<name>.csv so
EXPERIMENTS.md can be regenerated from the artifacts."""
from __future__ import annotations

import os

import pandas as pd

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "results")


def save(df: pd.DataFrame, name: str) -> pd.DataFrame:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{name}.csv")
    df.to_csv(path, index=False)
    return df
