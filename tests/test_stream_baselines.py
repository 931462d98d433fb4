"""Tests for the MASCOT / Trièst-IMPR / GPS streaming baselines."""
import numpy as np
import pytest

from repro.core.mascot_sql import (
    chunk_parallel_global,
    chunk_parallel_local,
    mascot_local_trial_counts,
    mascot_trial_estimates,
)
from repro.core.reference import mascot_trial_count
from repro.stream.gps import gps_processor
from repro.stream.mascot import mascot_processor
from repro.stream.triest import triest_processor
from tests.helpers import brute_force


@pytest.fixture(scope="module")
def yt(tables_for):
    return tables_for("YouTube", 0.1)


class TestMascot:
    @pytest.mark.parametrize("p", [0.2, 0.5])
    @pytest.mark.parametrize("seed", [1, 2, 3])
    def test_stream_matches_sql_and_reference(self, spark, yt, p, seed):
        tri = yt.triangles.toPandas()
        ref = mascot_trial_count(tri, p, seed) / (p * p)
        stream = mascot_processor(yt.stream, p, seed)["tau_hat"]
        sql = mascot_trial_estimates(spark, yt, p, [seed])[0]
        assert stream == pytest.approx(ref)
        assert sql == pytest.approx(ref)

    def test_p1_exact_global_and_local(self, yt):
        bf = brute_force(yt.stream)
        r = mascot_processor(yt.stream, 1.0, 5, track_local=True)
        assert r["tau_hat"] == yt.tau
        assert {v: int(x) for v, x in r["tau_v_hat"].items()} == bf["tau_v"]

    def test_sample_fraction(self, yt):
        p = 0.3
        r = mascot_processor(yt.stream, p, 9)
        frac = r["n_sampled"] / yt.stream.n_edges
        assert abs(frac - p) < 4 * np.sqrt(p * (1 - p) / yt.stream.n_edges)

    def test_unbiased(self, spark, yt):
        est = mascot_trial_estimates(spark, yt, 0.2, list(range(400)))
        se = est.std() / np.sqrt(len(est))
        assert abs(est.mean() - yt.tau) < 5 * se

    def test_variance_formula(self, spark, yt):
        from repro.core.estimators import var_parallel_mascot

        m = 5
        est = mascot_trial_estimates(spark, yt, 1 / m, [7000 + i for i in range(600)])
        want = var_parallel_mascot(yt.tau, yt.eta, m, 1)
        assert 0.55 < est.var() / want < 1.7

    def test_chunk_parallel_global(self):
        pool = np.arange(10, dtype=float)
        out = chunk_parallel_global(pool, 3)
        assert out.tolist() == [1.0, 4.0, 7.0]
        with pytest.raises(ValueError):
            chunk_parallel_global(pool[:2], 3)

    def test_chunk_parallel_reduces_error(self, spark, yt):
        pool = mascot_trial_estimates(spark, yt, 0.2, [100 + i for i in range(240)])
        err1 = np.abs(pool - yt.tau).mean()
        err8 = np.abs(chunk_parallel_global(pool, 8) - yt.tau).mean()
        assert err8 < err1

    def test_local_counts_match_stream(self, spark, yt):
        p, seed = 0.4, 11
        sql = mascot_local_trial_counts(spark, yt, p, [seed])
        got = {int(v): c for v, c in zip(sql["v"], sql["cnt"])}
        stream = mascot_processor(yt.stream, p, seed, track_local=True)["tau_v_hat"]
        want = {v: round(x * p * p) for v, x in stream.items() if x > 0}
        assert got == want

    def test_chunk_parallel_local(self, spark, yt):
        p = 0.4
        tc = mascot_local_trial_counts(spark, yt, p, [1, 2])
        sparse, n_runs = chunk_parallel_local(tc, 2, p, 2)
        assert n_runs == 1
        merged = tc.groupby("v")["cnt"].sum()
        for _, row in sparse.iterrows():
            assert row["est"] == pytest.approx(merged[row["v"]] / (p * p * 2))


class TestTriest:
    def test_big_budget_exact(self, yt):
        bf = brute_force(yt.stream)
        r = triest_processor(yt.stream, yt.stream.n_edges + 5, 3, track_local=True)
        assert r["tau_hat"] == yt.tau
        assert {v: int(x) for v, x in r["tau_v_hat"].items()} == bf["tau_v"]

    def test_budget_respected(self, yt):
        r = triest_processor(yt.stream, 100, 4)
        assert r["n_sampled"] == 100

    def test_deterministic_in_seed(self, yt):
        a = triest_processor(yt.stream, 150, 9)["tau_hat"]
        b = triest_processor(yt.stream, 150, 9)["tau_hat"]
        assert a == b

    def test_approximately_unbiased(self, yt):
        ests = [triest_processor(yt.stream, 250, s)["tau_hat"] for s in range(60)]
        mean = np.mean(ests)
        se = np.std(ests) / np.sqrt(len(ests))
        assert abs(mean - yt.tau) < 5 * se + 0.05 * yt.tau

    def test_weights_grow_late_in_stream(self, yt):
        # the IMPR weight at t >> M must exceed 1
        M = 100
        t = yt.stream.n_edges
        assert (t - 1) * (t - 2) / (M * (M - 1)) > 1

    def test_rejects_tiny_budget(self, yt):
        with pytest.raises(ValueError):
            triest_processor(yt.stream, 1, 0)


class TestGPS:
    def test_big_budget_exact(self, yt):
        r = gps_processor(yt.stream, yt.stream.n_edges + 5, 3)
        assert r["tau_hat"] == yt.tau

    def test_budget_respected(self, yt):
        r = gps_processor(yt.stream, 120, 4)
        assert r["n_sampled"] == 120

    def test_deterministic_in_seed(self, yt):
        a = gps_processor(yt.stream, 150, 9)["tau_hat"]
        b = gps_processor(yt.stream, 150, 9)["tau_hat"]
        assert a == b

    def test_approximately_unbiased(self, yt):
        ests = [gps_processor(yt.stream, 250, s)["tau_hat"] for s in range(60)]
        mean = np.mean(ests)
        assert abs(mean - yt.tau) < 0.25 * yt.tau

    def test_local_sums_to_3x_global(self, yt):
        r = gps_processor(yt.stream, 200, 5, track_local=True)
        assert sum(r["tau_v_hat"].values()) == pytest.approx(3 * r["tau_hat"])

    def test_rejects_tiny_budget(self, yt):
        with pytest.raises(ValueError):
            gps_processor(yt.stream, 1, 0)

    def test_higher_variance_than_triest_at_half_budget(self, yt):
        # the paper's memory accounting: GPS gets budget/2 and is worst
        g = np.array([gps_processor(yt.stream, 125, s)["tau_hat"] for s in range(40)])
        t = np.array([triest_processor(yt.stream, 250, s)["tau_hat"] for s in range(40)])
        g_mse = ((g - yt.tau) ** 2).mean()
        t_mse = ((t - yt.tau) ** 2).mean()
        assert g_mse > t_mse
