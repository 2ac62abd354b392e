"""Integration tests for the experiment harnesses (repro.analysis.experiments).

Tiny configurations of the exact code paths the benchmarks/jobs run,
checking row shapes, the paper-vs-measured columns, and the headline
orderings the paper reports.
"""
import numpy as np
import pytest

from repro.analysis import experiments as ex
from repro.graphs import datasets as ds

from .helpers import get_graph


class TestTable2:
    def test_rows_for_subset(self, spark):
        df = ex.table2_rows(spark, keys=("TH", "BC"))
        assert list(df["dataset"]) == ["TH", "BC"]
        assert {"n", "m", "cos2_phi", "paper_cos2"} <= set(df.columns)
        assert (df["cos2_phi"] > 0).all() and (df["cos2_phi"] <= 1).all()

    def test_paper_columns_quoted_verbatim(self, spark):
        df = ex.table2_rows(spark, keys=("TH",))
        assert df["paper_n"].iloc[0] == ds.PAPER_TABLE2["TH"]["n"]


class TestAdditiveTradeoff:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        g = get_graph(spark, "er_lognormal")
        return ex.additive_tradeoff(
            spark,
            g,
            dataset="er",
            sources=[0],
            rmax_grid=(1e-3,),
            delta_grid=(1e-1,),
            seed=0,
        )

    def test_all_methods_present(self, rows):
        assert set(rows["method"]) == {"EdgePush-Add", "MAPPR", "MC", "FORA", "SpeedPPR"}

    def test_metrics_populated(self, rows):
        for col in ("norm_max_add_err", "precision_norm", "conductance", "work"):
            assert rows[col].notna().all()
        assert (rows["work"] > 0).all()

    def test_push_methods_meet_rmax(self, rows):
        push = rows[rows["method"].isin(["EdgePush-Add", "MAPPR"])]
        assert (push["norm_max_add_err"] <= 1e-3 + 1e-9).all()

    def test_edgepush_cheapest_push_method(self, rows):
        by = rows.set_index("method")["work"]
        assert by["EdgePush-Add"] <= by["MAPPR"]


class TestL1Tradeoff:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        g = get_graph(spark, "er_lognormal")
        return ex.l1_tradeoff(
            spark,
            g,
            dataset="er",
            sources=[0],
            eps_grid=(1e-1,),
            iters_grid=(4,),
        )

    def test_methods(self, rows):
        assert set(rows["method"]) == {"EdgePush", "PowForPush", "PowerMethod"}

    def test_l1_bounds_hold(self, rows):
        push = rows[rows["method"].isin(["EdgePush", "PowForPush"])]
        assert (push["l1_err"] <= 1e-1 + 1e-9).all()
        pm = rows[rows["method"] == "PowerMethod"]
        assert (pm["l1_err"] <= 0.8**4 + 1e-9).all()

    def test_power_method_work_is_m_times_iters(self, rows, spark):
        g = get_graph(spark, "er_lognormal")
        pm = rows[rows["method"] == "PowerMethod"].iloc[0]
        assert pm["work"] == 4 * g.num_directed_edges()


class TestUnbalanceSweep:
    def test_rows_and_ordering(self, spark):
        df = ex.unbalance_sweep(
            spark, n=80, sources=1, rmax_grid=(1e-3,), eps_grid=(1e-1,), seed=0
        )
        assert set(df["method"]) == {"EdgePush-Add", "LocalPush", "EdgePush"}
        assert df["graph"].nunique() == 4
        # measured cos²φ increases across the four affinity graphs
        c = df.groupby("graph")["cos2_phi"].first()
        assert list(c.sort_index()) == sorted(c)


class TestTable1Complexity:
    def test_ratios_sequential(self, spark):
        g = get_graph(spark, "star")
        df = ex.table1_complexity(
            spark, {"star": g}, eps=0.05, rmax=1e-3, n_sources=2, impl="sequential"
        )
        row = df.iloc[0]
        assert row["measured_ratio_l1"] < 1
        assert 0 < row["predicted_ratio_l1"] < 1
        assert row["ep_work_l1"] <= row["lp_work_l1"]

    def test_ratios_batch(self, spark):
        g = get_graph(spark, "star")
        df = ex.table1_complexity(
            spark, {"star": g}, eps=0.05, rmax=1e-3, n_sources=1, impl="batch"
        )
        row = df.iloc[0]
        assert row["ep_work_l1"] <= row["lp_work_l1"]
        assert row["ep_work_add"] <= row["lp_work_add"] * 1.1
