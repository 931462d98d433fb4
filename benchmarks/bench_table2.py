"""Bench: Table II — dataset statistics of the synthetic analogs."""
from benchmarks.helpers import profile_datasets_or, once, show
from repro.experiments.table2 import run_table2


def bench_table2(benchmark, spark):
    out = once(benchmark, lambda: run_table2(spark, datasets=profile_datasets_or(None)))
    show("Table II — synthetic analogs vs paper", out)
    assert (out["triangles"] > 0).all()
