"""Benchmark plumbing: profile-dependent parameters and table printing."""
from __future__ import annotations

import pandas as pd

from repro.experiments.common import full_profile


def once(benchmark, fn):
    """Run an experiment harness exactly once under pytest-benchmark
    timing (harnesses are full sweeps; repeating them only re-measures
    Spark scheduling noise)."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)


def show(title: str, df: pd.DataFrame) -> None:
    print(f"\n=== {title} ===")
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print(df.to_string(index=False))


def profile_datasets_or(small: list[str]) -> list[str] | None:
    """Dataset list for the current profile (None → harness default of
    all eight under REPRO_FULL=1)."""
    return None if full_profile() else small
