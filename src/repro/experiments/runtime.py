"""Figure 7 — runtime of the four parallel methods vs p, at c = 10.

Each method runs its c = 10 processors as concurrent Spark tasks; the
reported time is the max per-processor loop time (the parallel
wall-clock of the paper's model, independent of scheduler noise). The
paper's shape: REPT ≈ parallel MASCOT, 2–4× faster than parallel
Trièst, 4–10× faster than parallel GPS.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.hashing import mix_seeds
from repro.experiments.common import dataset_seed, get_stream, profile_datasets, save_result
from repro.stream.engine import global_estimates, run_stream_trials

DEFAULT_P_INVS = (100, 50, 20, 10)


def run_runtime(
    spark: SparkSession,
    c: int = 10,
    p_invs: tuple[int, ...] = DEFAULT_P_INVS,
    datasets: list[str] | None = None,
    scale: float = 1.0,
    seed: int = 7,
) -> pd.DataFrame:
    """One row per (dataset, method, p): max and total per-processor time."""
    rows = []
    for name in profile_datasets(datasets):
        stream = get_stream(name, scale, seed)
        for p_inv in p_invs:
            p = 1.0 / p_inv
            base = dataset_seed(seed, name, p_inv, 7777)
            budget = max(2, round(p * stream.n_edges))
            specs: list[dict] = []
            meta: list[str] = []
            rept_seed = mix_seeds(base, 0)
            for i in range(c):
                specs.append({"method": "rept", "m": p_inv, "proc": i, "seed": rept_seed})
                meta.append("rept")
            for i in range(c):
                specs.append({"method": "mascot", "p": p, "seed": mix_seeds(base, 1, i)})
                meta.append("mascot")
            for i in range(c):
                specs.append({"method": "triest", "budget": budget, "seed": mix_seeds(base, 2, i)})
                meta.append("triest")
            for i in range(c):
                specs.append(
                    {"method": "gps", "budget": max(2, budget // 2), "seed": mix_seeds(base, 3, i)}
                )
                meta.append("gps")
            trials = global_estimates(run_stream_trials(spark, stream, specs))
            trials = trials.assign(method=meta)
            for meth, grp in trials.groupby("method"):
                rows.append(
                    {
                        "graph": name,
                        "method": meth,
                        "p": p,
                        "c": c,
                        "max_proc_time_s": grp["elapsed"].max(),
                        "total_proc_time_s": grp["elapsed"].sum(),
                        "mean_sampled_edges": grp["n_sampled"].mean(),
                    }
                )
    out = pd.DataFrame(rows)
    save_result(out, "fig7_runtime")
    return out
