"""Driver-side numpy reference for per-processor REPT/MASCOT outputs.

An independent third implementation path (besides the sequential
simulator and the Spark SQL engine) used by tests to cross-check the
*per-processor* quantities τ^(i), τ_v^(i), η^(i) bit-for-bit. Operates
on the collected triangle tables of a small graph.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.hashing import bucket, uniform01


def _u64(col: pd.Series) -> np.ndarray:
    return col.to_numpy().astype(np.int64).view(np.uint64)


def rept_processor_counts(
    tri: pd.DataFrame,
    open_edges: pd.DataFrame,
    last_edges: pd.DataFrame,
    m: int,
    c: int,
    seed: int,
) -> dict:
    """Per-processor τ^(i), τ_v^(i), η^(i) of REPT(1/m, c ≤ m) at seed.

    ``tri``/``open_edges``/``last_edges`` are the collected outputs of
    :func:`repro.graphs.exact.triangle_df` etc. Returns
    ``{"tau": ndarray[c], "eta": ndarray[c], "tau_v": {(i, v): cnt}}``.
    """
    if c > m:
        raise ValueError("reference covers the c <= m case only")
    b1 = bucket(_u64(tri["k1"]), seed, m)
    b2 = bucket(_u64(tri["k2"]), seed, m)
    mask = (b1 == b2) & (b1 < c)
    tau = np.bincount(b1[mask], minlength=c)[:c]

    tau_v: dict[tuple[int, int], int] = {}
    for colname in ("x", "y", "z"):
        vs = tri[colname].to_numpy()[mask]
        ps = b1[mask]
        for proc, v in zip(ps, vs):
            tau_v[(int(proc), int(v))] = tau_v.get((int(proc), int(v)), 0) + 1

    # x_g per sampled edge g (not-last multiplicity on processor h(g)).
    bg = bucket(_u64(open_edges["gk"]), seed, m)
    bp = bucket(_u64(open_edges["pk"]), seed, m)
    om = (bg == bp) & (bg < c)
    gk_open = open_edges["gk"].to_numpy()[om]
    keys_x, x = np.unique(gk_open, return_counts=True)
    proc_of_key = dict(zip(gk_open, bg[om]))

    bl = bucket(_u64(last_edges["gk"]), seed, m)
    bl1 = bucket(_u64(last_edges["p1"]), seed, m)
    bl2 = bucket(_u64(last_edges["p2"]), seed, m)
    lm = (bl1 == bl) & (bl2 == bl) & (bl < c)
    keys_y, y = np.unique(last_edges["gk"].to_numpy()[lm], return_counts=True)
    ymap = dict(zip(keys_y, y))

    eta = np.zeros(c, dtype=np.int64)
    for gk, xg in zip(keys_x, x):
        i = int(proc_of_key[gk])
        eta[i] += xg * (xg - 1) // 2 + xg * ymap.get(gk, 0)
    return {"tau": tau, "eta": eta, "tau_v": tau_v}


def mascot_trial_count(tri: pd.DataFrame, p: float, seed: int) -> int:
    """Semi-triangle count of one MASCOT trial at seed (truth for the
    SQL and streaming engines)."""
    u1 = uniform01(_u64(tri["k1"]), seed) < p
    u2 = uniform01(_u64(tri["k2"]), seed) < p
    return int((u1 & u2).sum())
