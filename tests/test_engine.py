"""Tests for the Spark-parallel streaming trial driver."""
import numpy as np
import pytest

from repro.stream.engine import (
    global_estimates,
    pooled_parallel_estimates,
    pooled_parallel_local,
    run_stream_trials,
)
from repro.stream.mascot import mascot_processor
from repro.stream.rept import rept_processor
from repro.stream.triest import triest_processor


@pytest.fixture(scope="module")
def yt(tables_for):
    return tables_for("YouTube", 0.1).stream


def test_all_trials_returned(spark, yt):
    specs = [{"method": "mascot", "p": 0.3, "seed": i} for i in range(7)]
    out = run_stream_trials(spark, yt, specs)
    ge = global_estimates(out)
    assert sorted(ge.index.tolist()) == list(range(7))


def test_empty_specs(spark, yt):
    out = run_stream_trials(spark, yt, [])
    assert out.empty


@pytest.mark.parametrize(
    "spec,direct",
    [
        ({"method": "rept", "m": 4, "proc": 1, "seed": 5}, lambda s: rept_processor(s, 4, 1, 5)["tau"]),
        ({"method": "mascot", "p": 0.25, "seed": 6}, lambda s: mascot_processor(s, 0.25, 6)["tau_hat"]),
        ({"method": "triest", "budget": 200, "seed": 7}, lambda s: triest_processor(s, 200, 7)["tau_hat"]),
    ],
)
def test_engine_matches_direct_call(spark, yt, spec, direct):
    out = global_estimates(run_stream_trials(spark, yt, [spec]))
    assert out["est"].iloc[0] == pytest.approx(direct(yt))


def test_rept_eta_carried(spark, yt):
    spec = {"method": "rept", "m": 3, "proc": 0, "seed": 2, "track_eta": True}
    out = global_estimates(run_stream_trials(spark, yt, [spec]))
    want = rept_processor(yt, 3, 0, 2, track_eta=True)["eta"]
    assert out["eta"].iloc[0] == want


def test_local_rows(spark, yt):
    spec = {"method": "mascot", "p": 0.5, "seed": 3}
    out = run_stream_trials(spark, yt, [spec], track_local=True)
    loc = out[out["v"] >= 0]
    want = mascot_processor(yt, 0.5, 3, track_local=True)["tau_v_hat"]
    got = {int(v): e for v, e in zip(loc["v"], loc["est"])}
    assert got == pytest.approx(want)


def test_elapsed_positive(spark, yt):
    specs = [{"method": "mascot", "p": 0.2, "seed": i} for i in range(3)]
    ge = global_estimates(run_stream_trials(spark, yt, specs))
    assert (ge["elapsed"] > 0).all()


def test_unknown_method_raises(spark, yt):
    with pytest.raises(Exception):
        run_stream_trials(spark, yt, [{"method": "nope", "seed": 1}])


def test_pooled_parallel_estimates():
    out = pooled_parallel_estimates(np.arange(12, dtype=float), 4)
    assert out.tolist() == [1.5, 5.5, 9.5]


def test_pooled_parallel_local(spark, yt):
    specs = [{"method": "mascot", "p": 0.5, "seed": i} for i in range(4)]
    out = run_stream_trials(spark, yt, specs, track_local=True)
    sparse, n_runs = pooled_parallel_local(out, 2, 4)
    assert n_runs == 2
    # spot-check one aggregated value
    direct = [mascot_processor(yt, 0.5, i, track_local=True)["tau_v_hat"] for i in range(2)]
    v = sparse["v"].iloc[0]
    run0 = sparse[(sparse["run"] == 0) & (sparse["v"] == v)]["est"].iloc[0]
    want = (direct[0].get(v, 0.0) + direct[1].get(v, 0.0)) / 2
    assert run0 == pytest.approx(want)
