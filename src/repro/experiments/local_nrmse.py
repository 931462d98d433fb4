"""Figures 5 & 6 — NRMSE of local (per-node) triangle count estimates.

REPT vs parallel MASCOT and Trièst (the paper omits GPS here). The
metric is the mean over nodes with τ_v > 0 of per-node NRMSE across
runs, with absent (run, node) estimates counted as 0 — see
:func:`repro.core.estimators.local_nrmse`.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.estimators import local_nrmse
from repro.core.hashing import mix_seeds
from repro.core.mascot_sql import chunk_parallel_local, mascot_local_trial_counts
from repro.core.rept_sql import rept_local_runs
from repro.experiments.common import dataset_seed, get_tables, profile_datasets, save_result
from repro.graphs.exact import local_counts_df
from repro.stream.engine import pooled_parallel_local, run_stream_trials

DEFAULT_METHODS = ("rept", "mascot", "triest")


def run_local_nrmse(
    spark: SparkSession,
    p_inv: int,
    c_list: list[int],
    datasets: list[str] | None = None,
    methods: tuple[str, ...] = DEFAULT_METHODS,
    r_rept: int = 40,
    r_pool: int = 6,
    scale: float = 1.0,
    seed: int = 7,
) -> pd.DataFrame:
    """One row per (dataset, method, c): mean local NRMSE."""
    m = p_inv
    p = 1.0 / m
    c_max = max(c_list)
    rows = []
    for name in profile_datasets(datasets):
        t = get_tables(spark, name, scale, seed)
        exact = local_counts_df(t.triangles).toPandas()
        base = dataset_seed(seed, name, p_inv, 99)
        budget = max(2, round(p * t.stream.n_edges))

        mascot_pool = None
        if "mascot" in methods:
            # MASCOT trials are cheap (SQL engine) — use a 2× pool.
            seeds = [mix_seeds(base, 1, i) for i in range(2 * r_pool * c_max)]
            mascot_pool = (mascot_local_trial_counts(spark, t, p, seeds), len(seeds))
        triest_pool = None
        if "triest" in methods:
            specs = [
                {"method": "triest", "budget": budget, "seed": mix_seeds(base, 2, i)}
                for i in range(r_pool * c_max)
            ]
            triest_pool = (
                run_stream_trials(spark, t.stream, specs, track_local=True),
                len(specs),
            )

        for c in c_list:
            if "rept" in methods:
                seeds = [mix_seeds(base, 4, c, i) for i in range(r_rept)]
                sparse = rept_local_runs(spark, t, m, c, seeds)
                rows.append(
                    {"graph": name, "method": "rept", "p": p, "c": c,
                     "nrmse": local_nrmse(sparse, exact, r_rept), "n_estimates": r_rept}
                )
            if mascot_pool is not None:
                sparse, n_runs = chunk_parallel_local(mascot_pool[0], c, p, mascot_pool[1])
                sparse = sparse.rename(columns={"trial": "run"})
                rows.append(
                    {"graph": name, "method": "mascot", "p": p, "c": c,
                     "nrmse": local_nrmse(sparse, exact, n_runs), "n_estimates": n_runs}
                )
            if triest_pool is not None:
                sparse, n_runs = pooled_parallel_local(triest_pool[0], c, triest_pool[1])
                rows.append(
                    {"graph": name, "method": "triest", "p": p, "c": c,
                     "nrmse": local_nrmse(sparse, exact, n_runs), "n_estimates": n_runs}
                )
    out = pd.DataFrame(rows)
    save_result(out, f"local_nrmse_pinv{p_inv}")
    return out
