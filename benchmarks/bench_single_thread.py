"""Bench: Figure 8 — REPT vs single-threaded baselines at equal memory."""
from benchmarks.helpers import once, show
from repro.experiments.single_thread import run_single_thread


def bench_fig8_pinv10(benchmark, spark):
    out = once(
        benchmark,
        lambda: run_single_thread(spark, p_inv=10, c_list=[2, 4, 8]),
    )
    show("Figure 8 (1/p=10) — runtime + NRMSE vs single-threaded", out)


def bench_fig8_pinv100(benchmark, spark):
    out = once(
        benchmark,
        lambda: run_single_thread(spark, p_inv=100, c_list=[2, 8, 32]),
    )
    show("Figure 8 (1/p=100) — runtime + NRMSE vs single-threaded", out)
    piv = out.pivot_table(index="c", columns="method", values="time_s")
    assert (piv["rept"] <= piv["triest_s"] + 1e-9).all()
