"""Bench: Figure 1 — variance terms τ(p⁻²−1) vs 2η(p⁻¹−1)."""
from benchmarks.helpers import profile_datasets_or, once, show
from repro.experiments.fig1 import run_fig1


def bench_fig1(benchmark, spark):
    out = once(benchmark, lambda: run_fig1(spark, datasets=profile_datasets_or(None)))
    show("Figure 1 — variance terms (covariance dominance)", out)
    # the high-η graphs must show covariance dominance at p = 0.1
    hi = out[(out["graph"].isin(["Twitter", "Flickr"])) & (out["p"] == 0.1)]
    assert (hi["cov_over_tau_term"] > 1).all()
