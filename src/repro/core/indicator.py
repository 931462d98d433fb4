"""Vectorized per-job indicator counting over Spark DataFrames.

The NRMSE sweeps need, for hundreds of hash seeds ("jobs"), the number
of rows of a triangle-level table satisfying a seed-dependent predicate.
Materializing the ``rows × jobs`` cross join through a shuffle would be
wasteful; instead a ``mapInPandas`` kernel evaluates every job against
each Arrow batch with numpy-vectorized hashing and emits only the tiny
aggregated counts. Total work is ``n_jobs × n_rows`` vector ops, spread
across Spark tasks.

``kernel(pdf, job) -> bool ndarray`` must be a pure function of the
batch columns and the job dict (picklable via cloudpickle closures).
"""
from __future__ import annotations

from typing import Callable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

Kernel = Callable[[pd.DataFrame, dict], np.ndarray]


def per_job_counts(df: DataFrame, jobs: list[dict], kernel: Kernel) -> pd.DataFrame:
    """Count matching rows per job. Returns pandas ``(job, cnt)`` with a
    row for every job (zero-filled)."""
    if not jobs:
        return pd.DataFrame({"job": pd.Series(dtype="int64"), "cnt": pd.Series(dtype="int64")})

    def _map(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        acc = np.zeros(len(jobs), dtype=np.int64)
        seen = False
        for pdf in batches:
            seen = True
            for j, job in enumerate(jobs):
                acc[j] += int(kernel(pdf, job).sum())
        if seen:
            yield pd.DataFrame({"job": np.arange(len(jobs), dtype=np.int64), "cnt": acc})

    partial = df.mapInPandas(_map, schema="job long, cnt long")
    out = partial.groupBy("job").sum("cnt").toPandas()
    out.columns = ["job", "cnt"]
    full = pd.DataFrame({"job": np.arange(len(jobs), dtype=np.int64)})
    out = full.merge(out, on="job", how="left").fillna({"cnt": 0})
    out["cnt"] = out["cnt"].astype("int64")
    return out.sort_values("job").reset_index(drop=True)


def per_job_key_counts(
    df: DataFrame, jobs: list[dict], kernel: Kernel, key_cols: list[str]
) -> DataFrame:
    """Count matching rows per ``(job, key)`` where each matching row
    contributes once per column in ``key_cols`` (e.g. the three vertices
    of a triangle). Matches are expected to be sparse, so the emitted
    partials stay small. Returns a Spark DataFrame ``(job, key, cnt)``
    (only nonzero counts)."""

    def _map(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            outs = []
            for j, job in enumerate(jobs):
                mask = kernel(pdf, job)
                if not mask.any():
                    continue
                for col in key_cols:
                    keys, cnts = np.unique(
                        pdf[col].to_numpy()[mask], return_counts=True
                    )
                    outs.append(
                        pd.DataFrame(
                            {
                                "job": np.full(len(keys), j, dtype=np.int64),
                                "key": keys.astype(np.int64),
                                "cnt": cnts.astype(np.int64),
                            }
                        )
                    )
            if outs:
                yield pd.concat(outs, ignore_index=True)

    partial = df.mapInPandas(_map, schema="job long, key long, cnt long")
    return partial.groupBy("job", "key").agg({"cnt": "sum"}).withColumnRenamed(
        "sum(cnt)", "cnt"
    )
