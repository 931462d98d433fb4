"""Estimator math from the paper plus the evaluation error metric.

Variance formulas (paper §III), the Graybill–Deal combination used by
Algorithm 2, and NRMSE (paper §IV-C) — including the local-count
variant where a run that sampled nothing at a node contributes an
estimate of 0.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def var_rept(tau: float, eta: float, m: int, c: int) -> float:
    """Var(τ̂) of REPT(1/m, c ≤ m): (τ(m²−c) + 2η(m−c)) / c."""
    return (tau * (m * m - c) + 2.0 * eta * (m - c)) / c


def var_rept_groups(tau: float, m: int, c1: int) -> float:
    """Var(τ̂) of REPT with c = c1·m full groups: τ(m−1)/c1."""
    return tau * (m - 1) / c1


def var_parallel_mascot(tau: float, eta: float, m: int, c: int) -> float:
    """Var of c-way parallel MASCOT at p = 1/m:
    (τ(m²−1) + 2η(m−1)) / c — the covariance term 2η(m−1) dominates."""
    return (tau * (m * m - 1) + 2.0 * eta * (m - 1)) / c


def graybill_deal(est1, var1, est2, var2):
    """Optimal inverse-variance combination of two unbiased estimates.

    When both plugin variances are zero (0/0 in the paper's formula —
    reached at nodes whose full-group counts are all zero) the
    combination degenerates; var1 = 0 means the plugin claims est1 is
    exact, so we return est1 — the same limit the formula takes for
    var1 → 0 with var2 > 0. Vectorized over numpy arrays.
    """
    est1 = np.asarray(est1, dtype=np.float64)
    est2 = np.asarray(est2, dtype=np.float64)
    var1 = np.asarray(var1, dtype=np.float64)
    var2 = np.asarray(var2, dtype=np.float64)
    tot = var1 + var2
    with np.errstate(invalid="ignore", divide="ignore"):
        comb = (var2 * est1 + var1 * est2) / tot
    return np.where(tot > 0, comb, est1)


def nrmse(estimates, truth: float) -> float:
    """sqrt(mean((μ̂ − μ)²)) / μ over independent runs."""
    est = np.asarray(estimates, dtype=np.float64)
    if truth == 0:
        raise ValueError("NRMSE undefined for zero truth")
    return float(np.sqrt(np.mean((est - truth) ** 2)) / truth)


def local_nrmse(
    sparse_estimates: pd.DataFrame, exact_local: pd.DataFrame, n_runs: int
) -> float:
    """Mean NRMSE of local triangle counts over nodes with τ_v > 0.

    ``sparse_estimates``: pandas ``(run, v, est)`` containing only the
    (run, node) pairs where the estimator produced a nonzero value; the
    remaining ``n_runs − count`` runs of each node are estimates of 0.
    ``exact_local``: pandas ``(v, tau_v)`` for all nodes with τ_v > 0.
    """
    truth = exact_local.set_index("v")["tau_v"].astype("float64")
    if sparse_estimates.empty:
        per_node_mse = truth**2
    else:
        est = sparse_estimates.merge(
            truth.rename("tau_v"), left_on="v", right_index=True, how="inner"
        )
        est["sq"] = (est["est"] - est["tau_v"]) ** 2
        g = est.groupby("v").agg(sq=("sq", "sum"), cnt=("run", "count"))
        g = g.reindex(truth.index, fill_value=0)
        per_node_mse = (g["sq"] + (n_runs - g["cnt"]) * truth**2) / n_runs
    return float((np.sqrt(per_node_mse) / truth).mean())
