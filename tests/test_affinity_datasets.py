"""Tests for affinity graphs (§6.3) and the Table-2 dataset-lite registry."""
import numpy as np
import pytest

from repro.analysis.unbalance import additive_unbalance_factor, cos2_phi
from repro.graphs import datasets as ds
from repro.graphs.affinity import (
    PAPER_CONFIGS,
    PAPER_COS2,
    affinity_graph,
    calibrated_affinity_graph,
    paper_affinity_graphs,
)

from .helpers import build


def _c2(pdf):
    w = np.concatenate([pdf.weight, pdf.weight])
    return np.sqrt(w).sum() ** 2 / (w.size * w.sum())


class TestAffinityGraph:
    def test_fully_connected(self):
        pdf = affinity_graph(30, kappa=2, sigma_n2=10.0, sigma2=10.0, seed=1)
        assert len(pdf) == 30 * 29 // 2

    def test_weights_in_unit_interval(self):
        pdf = affinity_graph(40, kappa=3, sigma_n2=5.0, sigma2=2.0, seed=2)
        assert (pdf.weight > 0).all()
        assert (pdf.weight <= 1.0).all()

    def test_deterministic(self):
        a = affinity_graph(20, kappa=2, sigma_n2=1.0, sigma2=1.0, seed=3)
        b = affinity_graph(20, kappa=2, sigma_n2=1.0, sigma2=1.0, seed=3)
        assert np.allclose(a.weight, b.weight)

    def test_wider_kernel_more_balanced(self):
        """cos²φ is increasing in σ² — the monotonicity the calibration
        bisection relies on."""
        lo = affinity_graph(100, kappa=2, sigma_n2=50.0, sigma2=5.0, seed=4)
        hi = affinity_graph(100, kappa=2, sigma_n2=50.0, sigma2=500.0, seed=4)
        assert _c2(hi) > _c2(lo)

    @pytest.mark.parametrize("target", [0.05, 0.3, 0.7])
    def test_calibration_hits_target(self, target):
        pdf = calibrated_affinity_graph(
            120, kappa=3, sigma_n2=10.0, target_cos2=target, seed=5
        )
        assert _c2(pdf) == pytest.approx(target, rel=0.05)

    def test_paper_configs_shape(self):
        assert len(PAPER_CONFIGS) == 4
        assert [c["kappa"] for c in PAPER_CONFIGS] == [1, 1, 13, 20]

    def test_paper_affinity_graphs_match_published_cos2(self):
        graphs = paper_affinity_graphs(120, seed=6)
        for pdf, target in zip(graphs, PAPER_COS2):
            assert _c2(pdf) == pytest.approx(target, rel=0.1)


class TestDatasetRegistry:
    def test_eight_specs(self):
        assert set(ds.SPECS) == set(ds.ALL_KEYS)
        assert len(ds.ALL_KEYS) == 8

    def test_paper_table2_complete(self):
        for k in ds.ALL_KEYS:
            row = ds.PAPER_TABLE2[k]
            assert {"n", "m", "mean_w", "max_w", "cos2"} <= set(row)

    @pytest.mark.parametrize("key", ["TH", "BC"])
    def test_real_lite_hits_target_cos2(self, spark, key):
        g = ds.load(spark, key)
        target = ds.PAPER_TABLE2[key]["cos2"]
        assert cos2_phi(g.csr) == pytest.approx(target, rel=0.3)

    def test_motif_lite_builds(self, spark):
        g = ds.load(spark, "YT")
        assert g.n > 100
        assert g.num_directed_edges() > 500
        w = g.edges.toPandas()["weight"]
        assert (w == w.astype(int)).all()  # triangle counts

    def test_load_cached(self, spark):
        assert ds.load(spark, "TH") is ds.load(spark, "TH")

    def test_lite_stats_ordering_matches_paper(self, spark):
        """The most/least unbalanced of the real-weighted lites should
        match the paper's ordering (TA/SP skewest, TH most balanced)."""
        cs = {k: cos2_phi(ds.load(spark, k).csr) for k in ("TA", "TH", "SP")}
        assert cs["TH"] > cs["SP"]
        assert cs["TH"] > cs["TA"]

    def test_unbalance_factors_consistent(self, spark):
        g = ds.load(spark, "BC")
        assert 0 < additive_unbalance_factor(g.csr) <= 1
