"""Bench: Figure 7 — per-processor runtime vs p at c = 10."""
from benchmarks.helpers import profile_datasets_or, once, show
from repro.experiments.runtime import run_runtime

SMALL = ["Twitter", "YouTube"]


def bench_fig7_runtime(benchmark, spark):
    out = once(
        benchmark,
        lambda: run_runtime(spark, c=10, datasets=profile_datasets_or(SMALL)),
    )
    show("Figure 7 — runtime at c=10 (max per-processor loop seconds)", out)
    piv = out.pivot_table(index=["graph", "p"], columns="method", values="max_proc_time_s")
    # paper shape: REPT ≈ MASCOT, both faster than Trièst and GPS
    assert (piv["rept"] < piv["gps"]).mean() > 0.7
