"""Smoke + behavioral tests of the experiment harnesses at tiny scale,
including the paper's headline claim (REPT beats naive parallelism).
"""
import numpy as np
import pytest

from repro.experiments.fig1 import run_fig1
from repro.experiments.global_nrmse import run_global_nrmse
from repro.experiments.local_nrmse import run_local_nrmse
from repro.experiments.runtime import run_runtime
from repro.experiments.single_thread import run_single_thread
from repro.experiments.table2 import run_table2
from tests.helpers import SMALL_SCALE

DS = ["YouTube", "Flickr"]


def test_table2(spark):
    out = run_table2(spark, datasets=DS, scale=SMALL_SCALE)
    assert set(out["graph"]) == set(DS)
    assert (out["triangles"] > 0).all()
    assert (out["paper_triangles"] > out["triangles"]).all()


def test_fig1(spark):
    out = run_fig1(spark, datasets=DS, ps=(0.1, 0.01), scale=SMALL_SCALE)
    assert len(out) == len(DS) * 2
    assert (out["term_tau"] > 0).all()
    # covariance term shrinks relative to tau term as p decreases
    for g in DS:
        sub = out[out["graph"] == g].set_index("p")
        assert (
            sub.loc[0.01, "cov_over_tau_term"] < sub.loc[0.1, "cov_over_tau_term"]
        )


def test_fig1_flickr_covariance_dominates(spark):
    # Needs cliques big enough for η/τ > ~6 (the paper's Fig 1 regime);
    # the default test scale shrinks them too far, so use 0.4.
    out = run_fig1(spark, datasets=["Flickr"], ps=(0.1,), scale=0.4)
    assert out["cov_over_tau_term"].iloc[0] > 1.0


class TestGlobalNRMSE:
    @pytest.fixture(scope="class")
    def result(self, spark):
        return run_global_nrmse(
            spark, p_inv=5, c_list=[2, 5], datasets=["Flickr"],
            r_rept=60, r_pool=8, scale=SMALL_SCALE,
        )

    def test_shape(self, result):
        assert set(result["method"]) == {"rept", "mascot", "triest", "gps"}
        assert set(result["c"]) == {2, 5}
        assert (result["nrmse"] >= 0).all() and np.isfinite(result["nrmse"]).all()

    def test_rept_beats_mascot_at_c_eq_m(self, result):
        sub = result[result["c"] == 5].set_index("method")["nrmse"]
        assert sub["rept"] < sub["mascot"]

    def test_error_decreases_with_c(self, result):
        rept = result[result["method"] == "rept"].set_index("c")["nrmse"]
        assert rept[5] < rept[2] * 1.2  # allow noise; must not blow up


def test_global_nrmse_c_gt_m(spark):
    out = run_global_nrmse(
        spark, p_inv=3, c_list=[7], datasets=["YouTube"],
        methods=("rept", "mascot"), r_rept=40, r_pool=6, scale=SMALL_SCALE,
    )
    sub = out.set_index("method")["nrmse"]
    assert np.isfinite(sub["rept"]) and sub["rept"] < sub["mascot"] * 1.5


def test_local_nrmse(spark):
    out = run_local_nrmse(
        spark, p_inv=4, c_list=[4], datasets=["Flickr"],
        r_rept=12, r_pool=3, scale=SMALL_SCALE,
    )
    assert set(out["method"]) == {"rept", "mascot", "triest"}
    assert (out["nrmse"] > 0).all() and np.isfinite(out["nrmse"]).all()
    sub = out.set_index("method")["nrmse"]
    assert sub["rept"] < sub["mascot"]


def test_runtime(spark):
    out = run_runtime(
        spark, c=3, p_invs=(10,), datasets=["YouTube"], scale=SMALL_SCALE
    )
    assert set(out["method"]) == {"rept", "mascot", "triest", "gps"}
    assert (out["max_proc_time_s"] > 0).all()
    assert (out["total_proc_time_s"] >= out["max_proc_time_s"]).all()


def test_single_thread(spark):
    out = run_single_thread(
        spark, dataset="Flickr", p_inv=10, c_list=[4], r_err=4, r_rept=12,
        scale=SMALL_SCALE,
    )
    assert set(out["method"]) == {"rept", "mascot_s", "triest_s", "gps_s"}
    assert (out["time_s"] > 0).all()
    assert np.isfinite(out["nrmse"]).all()
