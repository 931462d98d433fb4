"""Parallel fan-out of sequential streaming trials as Spark tasks.

A paper "processor" (or an independent baseline trial) is one unit of
work; the edge stream is broadcast once and each Spark task replays it
through the requested per-processor algorithm. This is the
distributed-dataflow realization of the paper's parallel model: REPT's
c processors genuinely run concurrently on the cluster (here local[*]).

Trial specs are dicts:

* ``{"method": "rept", "m", "proc", "seed", "track_eta"?}``
* ``{"method": "mascot", "p", "seed"}``
* ``{"method": "triest", "budget", "seed"}``
* ``{"method": "gps", "budget", "seed", "alpha"?}``

Output rows: ``(trial, v, est, eta, n_sampled, elapsed)`` where
``v = −1`` carries the trial's global value (REPT: raw τ^(i)/η^(i);
baselines: the trial's final estimate) and ``v ≥ 0`` rows are the
sparse local values when ``track_local``.
"""
from __future__ import annotations

import json
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.datasets import Stream
from repro.stream.gps import gps_processor
from repro.stream.mascot import mascot_processor
from repro.stream.rept import rept_processor
from repro.stream.triest import triest_processor

_SCHEMA = "trial long, v long, est double, eta double, n_sampled long, elapsed double"


def _run_one(stream: Stream, spec: dict, track_local: bool) -> tuple[dict, dict, dict]:
    """Dispatch one trial; returns (global result, local est, local eta)."""
    method = spec["method"]
    if method == "rept":
        r = rept_processor(
            stream, spec["m"], spec["proc"], spec["seed"],
            track_eta=bool(spec.get("track_eta")), track_local=track_local,
        )
        return (
            {"est": float(r["tau"]), "eta": float(r["eta"]),
             "n_sampled": r["n_sampled"], "elapsed": r["elapsed"]},
            r["tau_v"], r["eta_v"],
        )
    if method == "mascot":
        r = mascot_processor(stream, spec["p"], spec["seed"], track_local=track_local)
    elif method == "triest":
        r = triest_processor(stream, spec["budget"], spec["seed"], track_local=track_local)
    elif method == "gps":
        r = gps_processor(
            stream, spec["budget"], spec["seed"],
            alpha=spec.get("alpha", 9.0), track_local=track_local,
        )
    else:
        raise ValueError(f"unknown method {method!r}")
    return (
        {"est": float(r["tau_hat"]), "eta": 0.0,
         "n_sampled": r["n_sampled"], "elapsed": r["elapsed"]},
        r["tau_v_hat"], {},
    )


def run_stream_trials(
    spark: SparkSession,
    stream: Stream,
    specs: list[dict],
    track_local: bool = False,
) -> pd.DataFrame:
    """Run every spec as a Spark task over the broadcast stream; returns
    the concatenated output rows (see module docstring) as pandas."""
    if not specs:
        return pd.DataFrame(
            columns=["trial", "v", "est", "eta", "n_sampled", "elapsed"]
        )
    sc = spark.sparkContext
    bc = sc.broadcast(
        {"name": stream.name, "t": stream.t, "u": stream.u, "v": stream.v, "k": stream.k}
    )
    spec_pdf = pd.DataFrame(
        {
            "trial": np.arange(len(specs), dtype=np.int64),
            "spec": [json.dumps(s) for s in specs],
        }
    )
    n_part = min(len(specs), max(sc.defaultParallelism * 4, 16), 512)
    spec_df = spark.createDataFrame(spec_pdf).repartition(n_part)

    def _map(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        d = bc.value
        s = Stream(d["name"], d["t"], d["u"], d["v"], d["k"])
        for pdf in batches:
            rows: list[tuple] = []
            for trial, spec_json in zip(pdf["trial"], pdf["spec"]):
                spec = json.loads(spec_json)
                g, loc, loc_eta = _run_one(s, spec, track_local)
                rows.append(
                    (int(trial), -1, g["est"], g["eta"], g["n_sampled"], g["elapsed"])
                )
                if track_local:
                    for v, est in loc.items():
                        rows.append(
                            (int(trial), int(v), float(est),
                             float(loc_eta.get(v, 0.0)), 0, 0.0)
                        )
            if rows:
                yield pd.DataFrame(
                    rows,
                    columns=["trial", "v", "est", "eta", "n_sampled", "elapsed"],
                )

    try:
        out = spec_df.mapInPandas(_map, schema=_SCHEMA).toPandas()
    finally:
        bc.unpersist()
    return out.sort_values(["trial", "v"]).reset_index(drop=True)


def global_estimates(trials: pd.DataFrame) -> pd.DataFrame:
    """The ``v = −1`` rows of :func:`run_stream_trials` (one per trial)."""
    out = trials[trials["v"] == -1].set_index("trial").sort_index()
    return out


def pooled_parallel_estimates(trial_estimates: np.ndarray, c: int) -> np.ndarray:
    """Average disjoint chunks of c i.i.d. trials into parallel-c
    estimates (the paper's 'parallelize by averaging' baseline)."""
    n = (len(trial_estimates) // c) * c
    if n == 0:
        raise ValueError(f"need at least c={c} trials")
    return np.asarray(trial_estimates[:n], dtype=np.float64).reshape(-1, c).mean(axis=1)


def pooled_parallel_local(
    trials: pd.DataFrame, c: int, n_trials: int
) -> tuple[pd.DataFrame, int]:
    """Parallel-c local estimates from pooled per-trial sparse locals:
    run = trial // c, est = (Σ member estimates)/c (absent = 0).
    Returns (sparse pandas ``run, v, est``, n_runs)."""
    n_runs = n_trials // c
    if n_runs == 0:
        raise ValueError(f"need at least c={c} trials")
    loc = trials[(trials["v"] >= 0) & (trials["trial"] < n_runs * c)].copy()
    if loc.empty:
        return pd.DataFrame(columns=["run", "v", "est"]), n_runs
    loc["run"] = loc["trial"] // c
    out = loc.groupby(["run", "v"], as_index=False)["est"].sum()
    out["est"] = out["est"] / c
    return out[["run", "v", "est"]], n_runs
