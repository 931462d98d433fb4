"""Figures 3 & 4 — NRMSE of global triangle count estimates.

REPT vs parallel MASCOT / Trièst / GPS, at fixed p = 1/m, sweeping the
processor count c. REPT runs through the batch-equivalent SQL engine
(many hash seeds at once); MASCOT through its SQL trial pool; Trièst
and GPS have no batch shortcut and run as pooled sequential trials on
the streaming engine (budget p|E|, and p|E|/2 for GPS per the paper's
memory accounting). Pools are chunked into parallel-c estimates, so one
pool serves the whole c sweep.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.estimators import nrmse
from repro.core.hashing import mix_seeds
from repro.core.mascot_sql import chunk_parallel_global, mascot_trial_estimates
from repro.core.rept_sql import rept_global_runs
from repro.experiments.common import dataset_seed, get_tables, profile_datasets, save_result
from repro.stream.engine import global_estimates, pooled_parallel_estimates, run_stream_trials

DEFAULT_METHODS = ("rept", "mascot", "triest", "gps")


def run_global_nrmse(
    spark: SparkSession,
    p_inv: int,
    c_list: list[int],
    datasets: list[str] | None = None,
    methods: tuple[str, ...] = DEFAULT_METHODS,
    r_rept: int = 100,
    r_pool: int = 10,
    r_pool_mascot: int | None = None,
    scale: float = 1.0,
    seed: int = 7,
) -> pd.DataFrame:
    """One row per (dataset, method, c): measured NRMSE of τ̂.

    ``r_rept`` REPT runs per c; pooled methods build a pool of
    ``r_pool × max(c_list)`` trials reused across the sweep. MASCOT
    trials are nearly free (SQL engine), so its pool defaults to
    ``3 × r_pool`` for a less noisy REPT-vs-MASCOT comparison.
    """
    if r_pool_mascot is None:
        r_pool_mascot = 3 * r_pool
    m = p_inv
    p = 1.0 / m
    c_max = max(c_list)
    rows = []
    for name in profile_datasets(datasets):
        t = get_tables(spark, name, scale, seed)
        base = dataset_seed(seed, name, p_inv)
        budget = max(2, round(p * t.stream.n_edges))

        pools: dict[str, np.ndarray] = {}
        if "mascot" in methods:
            seeds = [mix_seeds(base, 1, i) for i in range(r_pool_mascot * c_max)]
            pools["mascot"] = mascot_trial_estimates(spark, t, p, seeds)
        for meth, budget_m in (("triest", budget), ("gps", max(2, budget // 2))):
            if meth not in methods:
                continue
            specs = [
                {"method": meth, "budget": budget_m, "seed": mix_seeds(base, 2 if meth == "triest" else 3, i)}
                for i in range(r_pool * c_max)
            ]
            trials = run_stream_trials(spark, t.stream, specs)
            pools[meth] = global_estimates(trials)["est"].to_numpy()

        for c in c_list:
            if "rept" in methods:
                seeds = [mix_seeds(base, 4, c, i) for i in range(r_rept)]
                est = rept_global_runs(spark, t, m, c, seeds)["tau_hat"].to_numpy()
                rows.append(
                    {"graph": name, "method": "rept", "p": p, "c": c,
                     "nrmse": nrmse(est, t.tau), "n_estimates": len(est)}
                )
            for meth, pool in pools.items():
                est = (
                    chunk_parallel_global(pool, c)
                    if meth == "mascot"
                    else pooled_parallel_estimates(pool, c)
                )
                rows.append(
                    {"graph": name, "method": meth, "p": p, "c": c,
                     "nrmse": nrmse(est, t.tau), "n_estimates": len(est)}
                )
    out = pd.DataFrame(rows)
    save_result(out, f"global_nrmse_pinv{p_inv}")
    return out
