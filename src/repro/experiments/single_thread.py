"""Figure 8 — REPT (c processors, p) vs single-threaded baselines using
the same total memory (MASCOT-S at probability c·p; Trièst-S / GPS-S at
budget c·p·|E|, GPS halved), on the Flickr analog.

Reported per (c, method): wall-clock (max per-processor loop time for
REPT, the single loop time for the -S baselines) and global NRMSE. The
paper's shape: REPT is up to two orders of magnitude faster with
comparable error (GPS-S worse on both).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.estimators import nrmse
from repro.core.hashing import mix_seeds
from repro.core.mascot_sql import mascot_trial_estimates
from repro.core.rept_sql import rept_global_runs
from repro.experiments.common import dataset_seed, get_tables, save_result
from repro.stream.engine import global_estimates, run_stream_trials


def run_single_thread(
    spark: SparkSession,
    dataset: str = "Flickr",
    p_inv: int = 100,
    c_list: list[int] | None = None,
    r_err: int = 12,
    r_rept: int = 60,
    scale: float = 1.0,
    seed: int = 7,
) -> pd.DataFrame:
    """One row per (c, method): runtime and NRMSE at equal memory."""
    c_list = c_list or [2, 8, 32]
    m = p_inv
    p = 1.0 / m
    t = get_tables(spark, dataset, scale, seed)
    n_edges = t.stream.n_edges
    base = dataset_seed(seed, dataset, p_inv, 8888)
    rows = []
    for c in c_list:
        p_s = min(1.0, c * p)
        budget_s = max(2, min(n_edges, round(c * p * n_edges)))

        # REPT: c concurrent processors; runtime = max processor time.
        rept_seed = mix_seeds(base, 0, c)
        specs = [
            {"method": "rept", "m": m, "proc": i, "seed": rept_seed,
             "track_eta": c > m and c % m != 0}
            for i in range(min(c, m))
        ]
        # For c > m the extra groups repeat the same per-processor work —
        # wall-clock is still one processor's loop; run one group for timing.
        rt = global_estimates(run_stream_trials(spark, t.stream, specs))
        seeds = [mix_seeds(base, 4, c, i) for i in range(r_rept)]
        est = rept_global_runs(spark, t, m, c, seeds)["tau_hat"].to_numpy()
        rows.append(
            {"dataset": dataset, "p": p, "c": c, "method": "rept",
             "time_s": rt["elapsed"].max(), "nrmse": nrmse(est, t.tau)}
        )

        # MASCOT-S: one processor at probability c·p.
        sm_seed = mix_seeds(base, 1, c)
        rt = global_estimates(
            run_stream_trials(
                spark, t.stream, [{"method": "mascot", "p": p_s, "seed": sm_seed}]
            )
        )
        est = mascot_trial_estimates(
            spark, t, p_s, [mix_seeds(base, 5, c, i) for i in range(r_err)]
        )
        rows.append(
            {"dataset": dataset, "p": p, "c": c, "method": "mascot_s",
             "time_s": rt["elapsed"].max(), "nrmse": nrmse(est, t.tau)}
        )

        # Trièst-S and GPS-S: sequential trials for both time and error.
        for meth, budget in (("triest", budget_s), ("gps", max(2, budget_s // 2))):
            specs = [
                {"method": meth, "budget": budget, "seed": mix_seeds(base, 6, c, meth == "gps", i)}
                for i in range(r_err)
            ]
            tr = global_estimates(run_stream_trials(spark, t.stream, specs))
            rows.append(
                {"dataset": dataset, "p": p, "c": c, "method": f"{meth}_s",
                 "time_s": tr["elapsed"].mean(), "nrmse": nrmse(tr["est"].to_numpy(), t.tau)}
            )
    out = pd.DataFrame(rows)
    rept_time = out[out["method"] == "rept"].set_index("c")["time_s"]
    out["speedup_vs_rept"] = out.apply(
        lambda r: rept_time[r["c"]] and r["time_s"] / rept_time[r["c"]], axis=1
    )
    save_result(out, f"fig8_single_thread_pinv{p_inv}")
    return out
