"""Bench: Figures 3 & 4 — global triangle count NRMSE sweeps.

Figure 4 (p = 0.1, c = 2..32) and Figure 3 (p = 0.01, c = 20..320).
"""
from benchmarks.helpers import profile_datasets_or, once, show
from repro.experiments.common import full_profile
from repro.experiments.global_nrmse import run_global_nrmse

SMALL = ["Twitter", "LiveJournal", "Flickr", "YouTube"]


def bench_fig4_p01(benchmark, spark):
    out = once(
        benchmark,
        lambda: run_global_nrmse(
            spark, p_inv=10, c_list=[2, 4, 8, 16, 32],
            datasets=profile_datasets_or(SMALL), r_rept=100, r_pool=10,
        ),
    )
    show("Figure 4 — global NRMSE, p=0.1", out)
    piv = out.pivot_table(index=["graph", "c"], columns="method", values="nrmse")
    assert (piv["rept"] < piv["mascot"]).mean() > 0.8


def bench_fig3_p001(benchmark, spark):
    c_list = [20, 40, 80, 160, 320] if full_profile() else [20, 80, 320]
    out = once(
        benchmark,
        lambda: run_global_nrmse(
            spark, p_inv=100, c_list=c_list,
            datasets=profile_datasets_or(SMALL), r_rept=60, r_pool=6,
        ),
    )
    show("Figure 3 — global NRMSE, p=0.01", out)
    piv = out.pivot_table(index=["graph", "c"], columns="method", values="nrmse")
    assert (piv["rept"] < piv["mascot"]).mean() > 0.6
