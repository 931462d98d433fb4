"""Shared plumbing for the experiment harnesses: dataset/table caching,
profile knobs, seed derivation, and result CSV output."""
from __future__ import annotations

import os

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.hashing import mix_seeds
from repro.graphs.datasets import DATASETS, Stream, load_stream
from repro.graphs.exact import TriangleTables, build_tables

_TABLES_CACHE: dict[tuple, TriangleTables] = {}

RESULTS_DIR = os.environ.get(
    "REPRO_RESULTS_DIR",
    os.path.join(os.path.dirname(__file__), "..", "..", "..", "results"),
)

#: default dataset subset of the "small" profile (spans the η/τ range);
#: REPRO_FULL=1 runs all eight Table II analogs.
SMALL_DATASETS = ["Twitter", "LiveJournal", "Flickr", "YouTube"]


def full_profile() -> bool:
    return os.environ.get("REPRO_FULL", "0") == "1"


def profile_datasets(requested: list[str] | None = None) -> list[str]:
    if requested is not None:
        return requested
    return list(DATASETS) if full_profile() else list(SMALL_DATASETS)


def get_tables(
    spark: SparkSession, name: str, scale: float = 1.0, seed: int = 7
) -> TriangleTables:
    """Memoized triangle tables (persisted DataFrames + exact τ, η)."""
    key = (name, scale, seed)
    if key not in _TABLES_CACHE:
        _TABLES_CACHE[key] = build_tables(spark, load_stream(name, scale, seed))
    return _TABLES_CACHE[key]


def get_stream(name: str, scale: float = 1.0, seed: int = 7) -> Stream:
    return load_stream(name, scale, seed)


def dataset_seed(base: int, name: str, *extra: int) -> int:
    """Stable per-(dataset, context) seed derivation."""
    return mix_seeds(base, DATASETS.index(name) + 1, *extra)


def save_result(df: pd.DataFrame, name: str) -> str:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{name}.csv")
    df.to_csv(path, index=False)
    return path
