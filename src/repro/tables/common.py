"""Shared helpers for the per-table reproduction harnesses."""
from __future__ import annotations

from functools import lru_cache

import pandas as pd

from ..graphs.datasets import DATASETS, DatasetSpec, load_dataset
from ..graphs.global_graph import GlobalGraph

__all__ = ["cached_dataset", "print_table", "DATASETS", "DatasetSpec"]


@lru_cache(maxsize=None)
def cached_dataset(name: str) -> tuple[GlobalGraph, DatasetSpec]:
    """Dataset stand-ins are deterministic, so cache per process — the
    jobs sweep many parameter combinations over the same graph."""
    return load_dataset(name)


def print_table(title: str, df: pd.DataFrame) -> pd.DataFrame:
    """Print one table in the paper's row format and return it."""
    print(f"\n=== {title} ===")
    with pd.option_context(
        "display.max_columns", None, "display.width", 200,
        "display.float_format", lambda x: f"{x:.3f}",
    ):
        print(df.to_string(index=False))
    return df
