"""Tests for the Theorem-2/3 threshold settings and Table-1 cost bounds."""
import numpy as np
import pytest

from repro.core import thresholds as th
from repro.oracle import assert_equivalent

from .helpers import GRAPH_BUILDERS, get_graph

ALPHA = 0.2


@pytest.fixture(params=list(GRAPH_BUILDERS))
def any_graph(request, spark):
    return get_graph(spark, request.param)


class TestNumpyThetas:
    def test_theta_l1_sums_to_eps(self, any_graph):
        """Lemma 4: Σθ(u,v) is the ℓ1 bound; Theorem 2's θ makes it exactly ε."""
        for eps in (0.5, 0.01):
            t = th.theta_l1(any_graph.csr, eps)
            assert t.sum() == pytest.approx(eps)

    def test_theta_l1_proportional_to_sqrt_weight(self, any_graph):
        csr = any_graph.csr
        t = th.theta_l1(csr, 0.1)
        ratio = t / np.sqrt(csr.weights)
        assert np.allclose(ratio, ratio[0])

    def test_theta_additive_local_constraint(self, any_graph):
        """Lemma 12's premise: Σ_{u∈N(v)} θ(u,v) ≤ r_max·d(v) — Theorem 3's
        θ meets it with equality."""
        csr = any_graph.csr
        rmax = 1e-3
        t = th.theta_additive(csr, rmax)
        per_dst = np.bincount(csr.indices, weights=t, minlength=csr.n)
        assert np.allclose(per_dst, rmax * csr.deg)

    def test_all_positive(self, any_graph):
        csr = any_graph.csr
        assert (th.theta_l1(csr, 1e-3) > 0).all()
        assert (th.theta_additive(csr, 1e-3) > 0).all()
        assert (th.theta_uniform(csr, 1e-3) == 1e-3).all()

    def test_theta_l1_is_cauchy_schwarz_optimal(self, any_graph):
        """Theorem 2's θ minimizes Cost subject to Σθ = ε: any perturbed
        positive θ' with the same sum costs at least as much."""
        csr = any_graph.csr
        eps = 0.1
        t_opt = th.theta_l1(csr, eps)
        cost_opt = th.edgepush_expected_cost(csr, t_opt, alpha=ALPHA)
        g = np.random.default_rng(0)
        for _ in range(5):
            t = t_opt * g.uniform(0.5, 2.0, size=t_opt.size)
            t *= eps / t.sum()
            assert th.edgepush_expected_cost(csr, t, alpha=ALPHA) >= cost_opt - 1e-9


class TestSparkThetas:
    @pytest.mark.parametrize("mode,tol", [("l1", 0.05), ("additive", 1e-3), ("uniform", 1e-4)])
    def test_spark_matches_numpy(self, any_graph, mode, tol):
        df = (
            th.thresholds_df(any_graph, mode=mode, tol=tol)
            .toPandas()
            .sort_values(["src", "dst"])
        )
        csr = any_graph.csr
        fn = {
            "l1": lambda: th.theta_l1(csr, tol),
            "additive": lambda: th.theta_additive(csr, tol),
            "uniform": lambda: th.theta_uniform(csr, tol),
        }[mode]
        assert np.allclose(df["theta"].to_numpy(), fn())

    def test_spark_l1_matches_oracle(self, any_graph):
        df = th.thresholds_df(any_graph, mode="l1", tol=0.1)
        assert_equivalent(
            df,
            "SELECT src, dst, weight, "
            "weight / SUM(weight) OVER (PARTITION BY src) AS p, "
            "0.1 * SQRT(weight) / (SELECT SUM(SQRT(weight)) FROM edges) AS theta "
            "FROM edges",
            edges=any_graph.edges,
        )

    def test_spark_additive_matches_oracle(self, any_graph):
        # tol=1.0 keeps theta values O(1): the oracle compares floats
        # rounded to 6 decimals, which is too coarse for 1e-4-scale values
        # whose Spark/DuckDB summation orders differ in the last ulp
        df = th.thresholds_df(any_graph, mode="additive", tol=1.0)
        assert_equivalent(
            df,
            "SELECT src, dst, weight, "
            "weight / SUM(weight) OVER (PARTITION BY src) AS p, "
            "1.0 * SUM(weight) OVER (PARTITION BY dst) * SQRT(weight) "
            "  / SUM(SQRT(weight)) OVER (PARTITION BY dst) AS theta "
            "FROM edges",
            edges=any_graph.edges,
        )

    def test_unknown_mode_raises(self, any_graph):
        with pytest.raises(ValueError):
            th.thresholds_df(any_graph, mode="nope", tol=0.1)


class TestCostBounds:
    def test_edgepush_never_worse_table1(self, any_graph):
        """Table 1 row 1: EdgePush's expected ℓ1 bound ≤ (1-α)·LocalPush's."""
        csr = any_graph.csr
        eps = 0.01
        lp = th.localpush_expected_cost(csr, alpha=ALPHA, theta=eps / csr.norm_a())
        ep = th.edgepush_expected_cost(csr, th.theta_l1(csr, eps), alpha=ALPHA)
        assert ep <= lp + 1e-6

    def test_edgepush_additive_never_worse(self, any_graph):
        csr = any_graph.csr
        rmax = 1e-4
        lp = th.localpush_expected_cost(csr, alpha=ALPHA, theta=rmax)
        ep = th.edgepush_expected_cost(csr, th.theta_additive(csr, rmax), alpha=ALPHA)
        assert ep <= lp + 1e-6

    def test_expected_cost_formulas(self, spark):
        """Closed forms: on a unit-weight graph the ℓ1-regime ratio is
        exactly (1-α) (cos²φ = 1)."""
        g = get_graph(spark, "triangle")
        csr = g.csr
        eps = 0.2
        lp = th.localpush_expected_cost(csr, alpha=ALPHA, theta=eps / csr.norm_a())
        ep = th.edgepush_expected_cost(csr, th.theta_l1(csr, eps), alpha=ALPHA)
        assert ep / lp == pytest.approx(1 - ALPHA)
