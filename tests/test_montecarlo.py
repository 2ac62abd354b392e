"""Tests for the Monte-Carlo walker, FORA and SpeedPPR baselines."""
import numpy as np
import pandas as pd
import pytest

from repro.core.fora import balanced_theta, fora
from repro.core.montecarlo import monte_carlo, run_walks, walk_count
from repro.core.power import ground_truth
from repro.core.speedppr import pow_for_push, speedppr

from .helpers import get_graph

ALPHA = 0.2


class TestWalkCount:
    def test_formula(self):
        # ω = (2·0.5/3 + 2)·ln(2/0.01)/(0.25·0.1)
        w = walk_count(delta=0.1, eps_r=0.5, p_f=0.01)
        expected = (2 * 0.5 / 3 + 2) * np.log(2 / 0.01) / (0.25 * 0.1)
        assert w == int(np.ceil(expected))

    def test_monotone_in_delta(self):
        assert walk_count(delta=1e-3, p_f=0.01) > walk_count(delta=1e-2, p_f=0.01)


class TestRunWalks:
    def test_terminal_mass_conserved(self, spark):
        g = get_graph(spark, "er_lognormal")
        starts = pd.DataFrame(
            {"walk_id": np.arange(500), "start": np.zeros(500, np.int64),
             "contrib": np.full(500, 1 / 500)}
        )
        per_node, steps = run_walks(spark, g.csr, starts, alpha=ALPHA, seed=1)
        assert per_node["contrib"].sum() == pytest.approx(1.0)
        assert steps > 0

    def test_deterministic_in_seed(self, spark):
        g = get_graph(spark, "triangle")
        starts = pd.DataFrame(
            {"walk_id": np.arange(200), "start": np.zeros(200, np.int64),
             "contrib": np.ones(200)}
        )
        a, _ = run_walks(spark, g.csr, starts, alpha=ALPHA, seed=7)
        b, _ = run_walks(spark, g.csr, starts, alpha=ALPHA, seed=7)
        pd.testing.assert_frame_equal(
            a.sort_values("node").reset_index(drop=True),
            b.sort_values("node").reset_index(drop=True),
        )

    def test_expected_steps_geometric(self, spark):
        """Mean walk length is (1-α)/α ≈ 4 for α = 0.2."""
        g = get_graph(spark, "er_lognormal")
        n_w = 2000
        starts = pd.DataFrame(
            {"walk_id": np.arange(n_w), "start": np.zeros(n_w, np.int64),
             "contrib": np.ones(n_w)}
        )
        _, steps = run_walks(spark, g.csr, starts, alpha=ALPHA, seed=3)
        assert steps / n_w == pytest.approx((1 - ALPHA) / ALPHA, rel=0.2)

    def test_weighted_sampling_respects_weights(self, spark):
        """On the star, almost all first moves go along the heavy edge."""
        g = get_graph(spark, "star")
        n_w = 3000
        starts = pd.DataFrame(
            {"walk_id": np.arange(n_w), "start": np.zeros(n_w, np.int64),
             "contrib": np.full(n_w, 1 / n_w)}
        )
        per_node, _ = run_walks(spark, g.csr, starts, alpha=ALPHA, seed=5)
        est = np.zeros(g.n)
        est[per_node["node"].to_numpy()] = per_node["contrib"].to_numpy()
        gt = ground_truth(g.csr, 0, alpha=ALPHA)
        assert abs(est[1] - gt[1]) < 0.05


class TestMonteCarlo:
    def test_unbiased_small_graph(self, spark):
        g = get_graph(spark, "triangle")
        res = monte_carlo(g, 0, alpha=ALPHA, n_walks=5000, seed=2)
        gt = ground_truth(g.csr, 0, alpha=ALPHA)
        assert np.abs(res.vector(g.n) - gt).max() < 0.03

    def test_estimate_sums_to_one(self, spark):
        g = get_graph(spark, "er_lognormal")
        res = monte_carlo(g, 0, n_walks=1000, seed=4)
        assert res.estimate["est"].sum() == pytest.approx(1.0)

    def test_cost_counts_walks(self, spark):
        g = get_graph(spark, "triangle")
        res = monte_carlo(g, 0, n_walks=300, seed=1)
        assert res.cost.walks == 300
        assert res.cost.walk_steps == res.cost.edge_touches

    def test_default_walk_count_from_params(self, spark):
        g = get_graph(spark, "two_node")
        res = monte_carlo(g, 0, delta=0.05, eps_r=0.5, p_f=0.1, seed=0)
        assert res.cost.walks == walk_count(delta=0.05, eps_r=0.5, p_f=0.1)


class TestFora:
    def test_more_accurate_than_push_alone(self, spark):
        g = get_graph(spark, "er_lognormal")
        gt = ground_truth(g.csr, 0, alpha=ALPHA)
        res = fora(g, 0, alpha=ALPHA, delta=1e-3, seed=6)
        assert np.abs(res.vector(g.n) - gt).sum() < 0.15

    def test_estimate_sums_near_one(self, spark):
        """Push reserve + walk repair accounts for all probability mass."""
        g = get_graph(spark, "star")
        res = fora(g, 0, alpha=ALPHA, delta=1e-2, seed=8)
        assert res.estimate["est"].sum() == pytest.approx(1.0, abs=1e-6)

    def test_combines_push_and_walk_cost(self, spark):
        g = get_graph(spark, "er_lognormal")
        res = fora(g, 0, alpha=ALPHA, delta=1e-3, seed=9)
        assert res.cost.pushes > 0
        assert res.cost.walks > 0

    def test_balanced_theta_formula(self, spark):
        g = get_graph(spark, "triangle")
        omega = 1000
        t = balanced_theta(g, alpha=ALPHA, omega=omega)
        assert t == pytest.approx(
            np.sqrt(g.num_directed_edges() / (ALPHA * omega)) / g.norm_a()
        )


class TestSpeedPPR:
    def test_powforpush_same_guarantee_as_localpush(self, spark):
        g = get_graph(spark, "er_lognormal")
        gt = ground_truth(g.csr, 0, alpha=ALPHA)
        rmax = 1e-3
        res = pow_for_push(g, 0, alpha=ALPHA, theta=rmax)
        err = np.abs(res.vector(g.n) - gt) / g.csr.deg
        assert err.max() <= rmax + 1e-9

    def test_powforpush_fewer_supersteps_when_scanning(self, spark):
        """Scan mode pushes sub-threshold residues too, so it can only
        converge in fewer (or equal) supersteps."""
        from repro.core.localpush import local_push

        g = get_graph(spark, "er_lognormal")
        plain = local_push(g, 0, alpha=ALPHA, theta=1e-5)
        pfp = pow_for_push(g, 0, alpha=ALPHA, theta=1e-5, scan_frac=0.05)
        assert pfp.cost.supersteps <= plain.cost.supersteps

    def test_speedppr_accuracy(self, spark):
        g = get_graph(spark, "er_lognormal")
        gt = ground_truth(g.csr, 0, alpha=ALPHA)
        res = speedppr(g, 0, alpha=ALPHA, delta=1e-3, seed=10)
        assert np.abs(res.vector(g.n) - gt).sum() < 0.15

    def test_speedppr_mass_conserved(self, spark):
        g = get_graph(spark, "star")
        res = speedppr(g, 0, alpha=ALPHA, delta=1e-2, seed=11)
        assert res.estimate["est"].sum() == pytest.approx(1.0, abs=1e-6)
