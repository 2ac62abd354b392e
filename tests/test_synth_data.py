"""Tests for the provided TPC-H-lite generators and our graph extension."""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.analysis.unbalance import cos2_phi
from repro.core.edgepush import edge_push
from repro.core.power import ground_truth
from repro.oracle import assert_equivalent


class TestProvidedGenerators:
    def test_lineitem_deterministic(self, spark):
        a = sd.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = sd.lineitem(spark, sf=0.001, seed=3).toPandas()
        assert a.equals(b)

    def test_lineitem_row_count_scales(self, spark):
        assert sd.lineitem(spark, sf=0.001).count() == 6000
        assert sd.orders(spark, sf=0.001).count() == 1500

    def test_zipf_keys_skewed(self, spark):
        pdf = sd.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3).toPandas()
        counts = pdf["k"].value_counts()
        assert counts.iloc[0] > 10 * counts.median()

    def test_uniform_keys_range(self, spark):
        pdf = sd.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert pdf["k"].between(1, 50).all()


class TestPartCooccurrence:
    @pytest.fixture(scope="class")
    def edges(self, spark):
        return sd.part_cooccurrence_edges(spark, sf=0.002, seed=1)

    def test_matches_oracle(self, spark, edges):
        li = (
            sd.lineitem(spark, sf=0.002, seed=1)
            .select("l_orderkey", "l_partkey")
            .toPandas()
        )
        assert_equivalent(
            edges,
            """
            WITH d AS (SELECT DISTINCT l_orderkey, l_partkey FROM li)
            SELECT a.l_partkey AS src, b.l_partkey AS dst,
                   CAST(COUNT(*) AS DOUBLE) AS weight
            FROM d a JOIN d b ON a.l_orderkey = b.l_orderkey
            WHERE a.l_partkey < b.l_partkey
            GROUP BY a.l_partkey, b.l_partkey
            """,
            li=li,
        )

    def test_canonical_pairs(self, edges):
        pdf = edges.toPandas()
        assert (pdf.src < pdf.dst).all()
        assert (pdf.weight >= 1).all()

    def test_graph_wraps_and_is_weighted(self, spark):
        g = sd.part_cooccurrence_graph(spark, sf=0.002, seed=1)
        assert g.n > 50
        assert 0 < cos2_phi(g.csr) <= 1

    def test_edgepush_runs_on_cooccurrence_graph(self, spark):
        """End-to-end: the paper's algorithm on the OLAP-derived graph."""
        g = sd.part_cooccurrence_graph(spark, sf=0.002, seed=1)
        s = g.sample_sources(1, seed=0)[0]
        res = edge_push(g, s, alpha=0.2, mode="l1", tol=0.2)
        gt = ground_truth(g.csr, s, alpha=0.2)
        assert np.abs(res.vector(g.n) - gt).sum() <= 0.2 + 1e-9
