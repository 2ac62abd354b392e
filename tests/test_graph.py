"""Tests for the weighted-graph substrate (repro.graphs.graph)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs import generators as gen
from repro.graphs.graph import WeightedGraph
from repro.oracle import assert_equivalent

from .helpers import GRAPH_BUILDERS, build, get_graph, triangle


@pytest.fixture(params=list(GRAPH_BUILDERS))
def any_graph(request, spark):
    return get_graph(spark, request.param)


class TestConstruction:
    def test_symmetric_edges(self, any_graph):
        pdf = any_graph.edges.toPandas()
        fwd = set(zip(pdf.src, pdf.dst))
        assert all((d, s) in fwd for s, d in fwd), "every edge needs its reverse"

    def test_symmetric_weights(self, any_graph):
        pdf = any_graph.edges.toPandas()
        w = {(s, d): w for s, d, w in pdf.itertuples(index=False)}
        assert all(abs(w[(s, d)] - w[(d, s)]) < 1e-12 for (s, d) in w)

    def test_no_self_loops(self, any_graph):
        assert any_graph.edges.filter("src = dst").count() == 0

    def test_node_ids_contiguous(self, any_graph):
        pdf = any_graph.edges.toPandas()
        ids = set(pdf.src) | set(pdf.dst)
        assert ids == set(range(any_graph.n))

    def test_zero_weight_edges_dropped(self, spark):
        g = build(
            spark,
            pd.DataFrame({"src": [0, 1], "dst": [1, 2], "weight": [1.0, 0.0]}),
        )
        assert g.num_directed_edges() == 2  # only 0-1 kept, both directions

    def test_positive_weights(self, any_graph):
        assert any_graph.edges.filter("weight <= 0").count() == 0


class TestDerived:
    def test_degrees_match_oracle(self, spark, any_graph):
        assert_equivalent(
            any_graph.degrees,
            "SELECT src AS node, SUM(weight) AS deg, COUNT(*) AS nbrs "
            "FROM edges GROUP BY src",
            edges=any_graph.edges,
        )

    def test_transition_rows_sum_to_one(self, any_graph):
        sums = (
            any_graph.transition.groupBy("src").sum("p").toPandas()["sum(p)"].to_numpy()
        )
        assert np.allclose(sums, 1.0)

    def test_transition_matches_oracle(self, spark, any_graph):
        assert_equivalent(
            any_graph.transition,
            "SELECT src, dst, weight, "
            "weight / SUM(weight) OVER (PARTITION BY src) AS p FROM edges",
            edges=any_graph.edges,
        )

    def test_norm_a_is_twice_undirected_weight(self, spark):
        pdf = gen.er_graph(30, 0.2, seed=1)
        g = build(spark, pdf)
        assert g.norm_a() == pytest.approx(2 * pdf["weight"].sum())


class TestCSR:
    def test_csr_roundtrip(self, any_graph):
        csr = any_graph.csr
        assert csr.nnz == any_graph.num_directed_edges()
        assert csr.indptr[-1] == csr.nnz
        g2 = WeightedGraph.from_csr(any_graph.spark, csr)
        a = any_graph.edges.toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
        b = g2.edges.toPandas().sort_values(["src", "dst"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b, check_dtype=False)

    def test_csr_degrees_match_spark(self, any_graph):
        csr = any_graph.csr
        deg = any_graph.degrees.toPandas().set_index("node")["deg"]
        assert np.allclose(csr.deg[deg.index.to_numpy()], deg.to_numpy())

    def test_cum_prob_monotone_per_node(self, any_graph):
        csr = any_graph.csr
        cp = csr.cum_prob()
        for u in range(csr.n):
            lo, hi = csr.indptr[u], csr.indptr[u + 1]
            seg = cp[lo:hi]
            if len(seg):
                assert np.all(np.diff(seg) > 0) or len(seg) == 1
                assert seg[-1] == 1.0

    def test_cum_prob_global_sorted_trick(self, any_graph):
        csr = any_graph.csr
        key = csr.src + csr.cum_prob()
        assert np.all(np.diff(key) > 0)

    def test_sample_sources_degree_weighted(self, spark):
        g = build(spark, gen.star_bad_case(30))
        srcs = g.sample_sources(200, seed=0)
        # hub (node 0) has ~half the total degree mass -> sampled often
        assert sum(1 for s in srcs if s in (0, 1)) > 100
        assert all(0 <= s < g.n for s in srcs)


class TestStats:
    def test_stats_counts(self, spark):
        pdf = gen.er_graph(40, 0.15, seed=3)
        g = build(spark, pdf)
        st = g.stats()
        assert st["n"] == 40
        assert st["m"] == len(pdf)
        assert st["mean_weight"] == pytest.approx(1.0)
        assert st["cos2_phi"] == pytest.approx(1.0)  # unit weights: balanced

    def test_stats_cos2_matches_oracle(self, spark, any_graph):
        st = any_graph.stats()
        import duckdb

        con = duckdb.connect()
        con.register("edges", any_graph.edges.toPandas())
        c = con.execute(
            "SELECT POW(SUM(SQRT(weight)), 2) / (COUNT(*) * SUM(weight)) FROM edges"
        ).fetchone()[0]
        con.close()
        assert st["cos2_phi"] == pytest.approx(c, rel=1e-9)

    def test_star_is_unbalanced(self, spark):
        st = build(spark, gen.star_bad_case(200)).stats()
        assert st["cos2_phi"] < 0.2  # Figure-1 graph is heavily unbalanced
