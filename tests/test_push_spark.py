"""Tests for the distributed batch LocalPush and EdgePush (the core repro).

The batch (bulk-synchronous) schedules must satisfy the same terminal
guarantees as the sequential references: residues below thresholds, the
paper's error bounds, underestimation, and — for EdgePush vs LocalPush —
the work advantage on unbalanced graphs.

Spark supersteps are expensive, so these tests use the small helper graphs
and moderate tolerances; the fine-grained sweeps live in benchmarks/.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core import thresholds as th
from repro.core.edgepush import edge_push
from repro.core.localpush import local_push
from repro.core.power import ground_truth
from repro.core.sequential import sequential_edge_push, sequential_local_push

from .helpers import get_graph

ALPHA = 0.2
SPARK_GRAPHS = ["two_node", "star", "er_lognormal", "complete_unbalanced"]


@pytest.fixture(params=SPARK_GRAPHS)
def any_graph(request, spark):
    return get_graph(spark, request.param)


class TestBatchLocalPush:
    def test_l1_bound_and_underestimate(self, any_graph):
        csr = any_graph.csr
        eps = 0.1
        res = local_push(any_graph, 0, alpha=ALPHA, theta=eps / csr.norm_a())
        gt = ground_truth(csr, 0, alpha=ALPHA)
        est = res.vector(any_graph.n)
        assert (est <= gt + 1e-9).all()
        assert np.abs(est - gt).sum() <= eps + 1e-9

    def test_additive_bound(self, any_graph):
        csr = any_graph.csr
        rmax = 1e-3
        res = local_push(any_graph, 0, alpha=ALPHA, theta=rmax)
        gt = ground_truth(csr, 0, alpha=ALPHA)
        err = np.abs(res.vector(any_graph.n) - gt) / csr.deg
        assert err.max() <= rmax + 1e-9

    def test_terminal_residues_below_threshold(self, any_graph):
        theta = 1e-3
        _, state = local_push(
            any_graph, 0, alpha=ALPHA, theta=theta, return_state=True
        )
        bad = state.filter(F.col("r") >= F.col("deg") * theta).count()
        assert bad == 0

    def test_matches_sequential_estimate_scale(self, any_graph):
        """Batch and sequential schedules both satisfy Fact 1 with the same
        θ, so their estimates agree within 2× the ℓ1 budget."""
        csr = any_graph.csr
        eps = 0.05
        theta = eps / csr.norm_a()
        batch = local_push(any_graph, 0, alpha=ALPHA, theta=theta)
        seq = sequential_local_push(csr, 0, alpha=ALPHA, theta=theta)
        assert np.abs(batch.vector(any_graph.n) - seq.pi).sum() <= 2 * eps

    def test_mass_conservation(self, any_graph):
        """reserve + residual mass sums to 1 at all times."""
        theta = 1e-2
        _, state = local_push(any_graph, 0, alpha=ALPHA, theta=theta, return_state=True)
        tot = state.agg(F.sum("pi"), F.sum("r")).collect()[0]
        # residual r carries (1-α)-scaled in-flight mass; π̂ + remaining
        # walk mass = 1 exactly when accounting for the α-absorption of r:
        # each unit of r will eventually deposit exactly 1 unit across nodes.
        assert tot[0] + tot[1] == pytest.approx(1.0, abs=1e-9)

    def test_invariant_holds_mid_run(self, spark):
        """Lemma 1 for the *batch* schedule, checked at an intermediate
        superstep: π(t) = π̂(t) + Σ_u r(u)·π_u(t)."""
        g = get_graph(spark, "er_lognormal")
        csr = g.csr
        res, state = local_push(
            g, 0, alpha=ALPHA, theta=1e-5, max_supersteps=2, return_state=True
        )
        pprs = np.stack([ground_truth(csr, u, alpha=ALPHA) for u in range(csr.n)])
        sp = state.toPandas()
        r = np.zeros(csr.n)
        r[sp["node"].to_numpy(np.int64)] = sp["r"].to_numpy()
        assert np.allclose(res.vector(g.n) + r @ pprs, pprs[0], atol=1e-6)

    def test_cost_counts_node_degrees(self, spark):
        g = get_graph(spark, "star")
        res = local_push(g, 0, alpha=ALPHA, theta=0.9)
        # single superstep: only the source pushes, touching all its edges
        assert res.cost.supersteps >= 1
        assert res.cost.edge_touches >= g.csr.out_degree()[0]

    def test_scan_mode_same_result(self, spark):
        g = get_graph(spark, "er_lognormal")
        csr = g.csr
        theta = 1e-3
        plain = local_push(g, 0, alpha=ALPHA, theta=theta)
        scan = local_push(g, 0, alpha=ALPHA, theta=theta, scan_frac=0.05)
        gt = ground_truth(csr, 0, alpha=ALPHA)
        for r in (plain, scan):
            assert (np.abs(r.vector(g.n) - gt) / csr.deg).max() <= theta + 1e-9


class TestBatchEdgePush:
    @pytest.mark.parametrize("eps", [0.3, 0.05])
    def test_l1_bound_theorem2(self, any_graph, eps):
        csr = any_graph.csr
        res = edge_push(any_graph, 0, alpha=ALPHA, mode="l1", tol=eps)
        gt = ground_truth(csr, 0, alpha=ALPHA)
        est = res.vector(any_graph.n)
        assert (est <= gt + 1e-9).all()
        assert np.abs(est - gt).sum() <= eps + 1e-9

    def test_additive_bound_theorem3(self, any_graph):
        csr = any_graph.csr
        rmax = 1e-3
        res = edge_push(any_graph, 0, alpha=ALPHA, mode="additive", tol=rmax)
        gt = ground_truth(csr, 0, alpha=ALPHA)
        err = np.abs(res.vector(any_graph.n) - gt) / csr.deg
        assert err.max() <= rmax + 1e-9

    def test_terminal_edge_residues_below_threshold(self, any_graph):
        _, edges = edge_push(
            any_graph, 0, alpha=ALPHA, mode="l1", tol=0.1, return_residue=True
        )
        assert edges.filter(F.col("r") >= F.col("theta")).count() == 0

    def test_matches_sequential(self, any_graph):
        csr = any_graph.csr
        eps = 0.05
        batch = edge_push(any_graph, 0, alpha=ALPHA, mode="l1", tol=eps)
        seq = sequential_edge_push(csr, 0, th.theta_l1(csr, eps), alpha=ALPHA)
        assert np.abs(batch.vector(any_graph.n) - seq.pi).sum() <= 2 * eps

    def test_work_advantage_on_star(self, spark):
        """The headline claim at batch granularity: on the Figure-1 graph,
        EdgePush does a small fraction of LocalPush's edge touches for the
        same ℓ1 guarantee."""
        g = get_graph(spark, "star")
        eps = 0.1
        lp = local_push(g, 0, alpha=ALPHA, theta=eps / g.csr.norm_a())
        ep = edge_push(g, 0, alpha=ALPHA, mode="l1", tol=eps)
        assert ep.cost.edge_touches < lp.cost.edge_touches / 3

    def test_prebuilt_thresholds_df(self, spark):
        g = get_graph(spark, "two_node")
        tdf = th.thresholds_df(g, mode="l1", tol=0.2)
        a = edge_push(g, 0, alpha=ALPHA, thresholds=tdf)
        b = edge_push(g, 0, alpha=ALPHA, mode="l1", tol=0.2)
        va, vb = a.vector(g.n), b.vector(g.n)
        assert np.allclose(va, vb)

    def test_scan_mode_same_guarantee(self, spark):
        g = get_graph(spark, "er_lognormal")
        res = edge_push(g, 0, alpha=ALPHA, mode="l1", tol=0.05, scan_frac=0.05)
        gt = ground_truth(g.csr, 0, alpha=ALPHA)
        assert np.abs(res.vector(g.n) - gt).sum() <= 0.05 + 1e-9

    def test_uniform_mode_ablation(self, spark):
        """Ablation: flat θ = ε/2m spends the same ℓ1 budget (Σθ = ε) but
        its *expected* cost bound (the quantity Theorem 2 optimizes, over
        degree-sampled sources) is worse on an unbalanced graph; both
        settings still meet the ℓ1 guarantee."""
        g = get_graph(spark, "star")
        csr = g.csr
        eps = 0.1
        tuned_bound = th.edgepush_expected_cost(csr, th.theta_l1(csr, eps), alpha=ALPHA)
        flat_bound = th.edgepush_expected_cost(
            csr, th.theta_uniform(csr, eps / csr.nnz), alpha=ALPHA
        )
        assert tuned_bound < flat_bound
        gt = ground_truth(csr, 0, alpha=ALPHA)
        flat = edge_push(g, 0, alpha=ALPHA, mode="uniform", tol=eps / csr.nnz)
        assert np.abs(flat.vector(g.n) - gt).sum() <= eps + 1e-9

    def test_invariant_holds_mid_run(self, spark):
        """Lemma 2 for the *batch* schedule, checked at an intermediate
        superstep: π(t) = α·q(t) + Σ_{⟨u,v⟩} R_uv·π_v(t)."""
        g = get_graph(spark, "er_lognormal")
        csr = g.csr
        res, edges = edge_push(
            g, 0, alpha=ALPHA, mode="l1", tol=1e-3, max_supersteps=2,
            return_residue=True,
        )
        pprs = np.stack([ground_truth(csr, v, alpha=ALPHA) for v in range(csr.n)])
        epdf = edges.toPandas()
        correction = np.zeros(csr.n)
        for _, row in epdf[epdf.r > 0].iterrows():
            correction += row.r * pprs[int(row.dst)]
        assert np.allclose(res.vector(g.n) + correction, pprs[0], atol=1e-6)

    def test_source_with_offset(self, spark):
        """Pushing from a non-hub source also meets the bound."""
        g = get_graph(spark, "star")
        gt = ground_truth(g.csr, 2, alpha=ALPHA)
        res = edge_push(g, 2, alpha=ALPHA, mode="l1", tol=0.1)
        assert np.abs(res.vector(g.n) - gt).sum() <= 0.1 + 1e-9
