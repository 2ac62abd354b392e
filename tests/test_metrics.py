"""Tests for repro.core.metrics (error measures, precision@k, sweep cut)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import metrics as M
from repro.core.power import ground_truth
from repro.graphs import generators as gen
from repro.oracle import assert_equivalent

from .helpers import build, get_graph


class TestVectorMetrics:
    def test_l1_error(self):
        a = np.array([0.5, 0.3, 0.2])
        b = np.array([0.4, 0.4, 0.2])
        assert M.l1_error(a, b) == pytest.approx(0.2)

    def test_max_add_err(self):
        a = np.array([0.5, 0.3, 0.2])
        b = np.array([0.4, 0.35, 0.2])
        assert M.max_add_err(a, b) == pytest.approx(0.1)

    def test_normalized_max_add_err(self):
        a = np.array([0.5, 0.5])
        b = np.array([0.4, 0.5])
        deg = np.array([10.0, 1.0])
        assert M.normalized_max_add_err(a, b, deg) == pytest.approx(0.01)

    def test_zero_for_identical(self):
        a = np.random.default_rng(0).random(50)
        assert M.l1_error(a, a) == 0
        assert M.max_add_err(a, a) == 0


class TestPrecisionAtK:
    def test_perfect(self):
        v = np.arange(100, dtype=float)
        assert M.precision_at_k(v, v, k=10) == 1.0

    def test_disjoint(self):
        gt = np.arange(100, dtype=float)
        est = -gt
        assert M.precision_at_k(est, gt, k=10) == 0.0

    def test_partial_overlap(self):
        gt = np.zeros(20)
        gt[:10] = np.arange(10, 0, -1)
        est = np.zeros(20)
        est[5:15] = np.arange(10, 0, -1)
        assert M.precision_at_k(est, gt, k=10) == pytest.approx(0.5)

    def test_normalized_ranking_changes_order(self):
        gt = np.array([0.5, 0.4, 0.1])
        deg = np.array([100.0, 1.0, 1.0])
        # unnormalized top-1 is node 0; normalized top-1 is node 1
        assert M.precision_at_k(gt, gt, k=1) == 1.0
        top_norm = np.argsort(-(gt / deg))[0]
        assert top_norm == 1

    def test_self_precision_always_one(self, spark):
        g = get_graph(spark, "er_lognormal")
        pi = ground_truth(g.csr, 0)
        assert M.precision_at_k(pi, pi, k=50, deg=g.csr.deg) == 1.0


class TestConductance:
    def test_two_cliques_cut(self, spark):
        """Two 5-cliques joined by one edge: the clique is the best sweep
        cut and its conductance is 1/(vol of clique side)."""
        cl1 = gen.complete_graph(5)
        cl2 = gen.complete_graph(5)
        cl2[["src", "dst"]] += 5
        bridge = pd.DataFrame({"src": [0], "dst": [5], "weight": [1.0]})
        g = build(spark, pd.concat([cl1, cl2, bridge], ignore_index=True))
        members = np.zeros(g.n, dtype=bool)
        members[:5] = True
        phi = M.conductance_of_set(g.csr, members)
        assert phi == pytest.approx(1.0 / 21.0)  # cut=1, vol=2*10+1

    def test_sweep_finds_planted_cluster(self, spark):
        cl1 = gen.complete_graph(6)
        cl2 = gen.complete_graph(6)
        cl2[["src", "dst"]] += 6
        bridge = pd.DataFrame({"src": [0], "dst": [6], "weight": [1.0]})
        g = build(spark, pd.concat([cl1, cl2, bridge], ignore_index=True))
        pi = ground_truth(g.csr, 1)
        best, size = M.sweep_conductance(g.csr, pi / g.csr.deg)
        assert size == 6
        members = np.zeros(g.n, dtype=bool)
        members[:6] = True
        assert best == pytest.approx(M.conductance_of_set(g.csr, members))

    def test_sweep_curve_matches_set_conductance(self, spark):
        g = get_graph(spark, "er_lognormal")
        pi = ground_truth(g.csr, 0)
        score = pi / g.csr.deg
        best, size, curve = M.sweep_conductance(g.csr, score, return_curve=True)
        order = np.argsort(-score, kind="stable")
        order = order[score[order] > 0]
        for i in (0, len(curve) // 2, len(curve) - 1):
            members = np.zeros(g.n, dtype=bool)
            members[order[: i + 1]] = True
            assert curve[i] == pytest.approx(
                M.conductance_of_set(g.csr, members), rel=1e-9
            )

    def test_symmetric_set_complement(self, spark):
        g = get_graph(spark, "er_lognormal")
        rng = np.random.default_rng(1)
        members = rng.random(g.n) < 0.3
        assert M.conductance_of_set(g.csr, members) == pytest.approx(
            M.conductance_of_set(g.csr, ~members)
        )

    def test_conductance_df_matches_numpy(self, spark):
        g = get_graph(spark, "er_lognormal")
        rng = np.random.default_rng(2)
        members = rng.random(g.n) < 0.4
        mdf = g.spark.createDataFrame(
            pd.DataFrame({"node": np.flatnonzero(members)})
        )
        row = M.conductance_df(g, mdf).collect()[0]
        assert row["conductance"] == pytest.approx(
            M.conductance_of_set(g.csr, members), rel=1e-9
        )

    def test_conductance_df_matches_oracle(self, spark):
        g = get_graph(spark, "er_lognormal")
        members = pd.DataFrame({"node": np.arange(0, g.n, 3)})
        mdf = g.spark.createDataFrame(members)
        assert_equivalent(
            M.conductance_df(g, mdf),
            """
            WITH flags AS (
              SELECT e.weight,
                     s.node IS NOT NULL AS src_in,
                     d.node IS NOT NULL AS dst_in
              FROM edges e
              LEFT JOIN members s ON e.src = s.node
              LEFT JOIN members d ON e.dst = d.node
            )
            SELECT
              SUM(CASE WHEN src_in <> dst_in THEN weight ELSE 0 END)/2.0 AS cut,
              SUM(CASE WHEN src_in THEN weight ELSE 0 END) AS vol_s,
              SUM(CASE WHEN NOT src_in THEN weight ELSE 0 END) AS vol_rest,
              (SUM(CASE WHEN src_in <> dst_in THEN weight ELSE 0 END)/2.0)
                / LEAST(SUM(CASE WHEN src_in THEN weight ELSE 0 END),
                        SUM(CASE WHEN NOT src_in THEN weight ELSE 0 END)) AS conductance
            FROM flags
            """,
            edges=g.edges,
            members=members,
        )
