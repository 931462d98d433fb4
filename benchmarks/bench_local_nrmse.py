"""Bench: Figures 5 & 6 — local triangle count NRMSE sweeps."""
from benchmarks.helpers import profile_datasets_or, once, show
from repro.experiments.local_nrmse import run_local_nrmse

SMALL = ["Twitter", "Flickr", "YouTube"]


def bench_fig6_p01(benchmark, spark):
    out = once(
        benchmark,
        lambda: run_local_nrmse(
            spark, p_inv=10, c_list=[2, 8, 32],
            datasets=profile_datasets_or(SMALL), r_rept=30, r_pool=5,
        ),
    )
    show("Figure 6 — local NRMSE, p=0.1", out)
    piv = out.pivot_table(index=["graph", "c"], columns="method", values="nrmse")
    assert (piv["rept"] < piv["mascot"]).mean() > 0.6


def bench_fig5_p001(benchmark, spark):
    out = once(
        benchmark,
        lambda: run_local_nrmse(
            spark, p_inv=100, c_list=[20, 80, 320],
            datasets=profile_datasets_or(SMALL), r_rept=20, r_pool=4,
        ),
    )
    show("Figure 5 — local NRMSE, p=0.01", out)
