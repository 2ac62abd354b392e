"""Experiment harnesses reproducing the paper's evaluation artifacts (§6).

Each function returns a tidy ``pandas.DataFrame`` of rows, one per
(dataset, method, parameter) point, mirroring the corresponding paper
table/figure. ``jobs/*.py`` are thin spark-submit CLIs over these, and
``benchmarks/bench_*.py`` print the rows that EXPERIMENTS.md quotes.

Two cost axes are reported for every run (see DESIGN.md §4):

- ``work`` — machine-independent edge touches (pushes + walk steps), the
  quantity the paper's Table-1 theory bounds; shape comparisons use this;
- ``wall_s`` — local-mode Spark wall-clock, dominated by superstep
  overhead, recorded for completeness.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.analysis import unbalance as U
from repro.core import metrics as M
from repro.core import thresholds as th
from repro.core.edgepush import edge_push
from repro.core.fora import fora
from repro.core.localpush import local_push
from repro.core.montecarlo import monte_carlo
from repro.core.power import ground_truth, power_method
from repro.core.sequential import sequential_edge_push, sequential_local_push
from repro.core.speedppr import pow_for_push, speedppr
from repro.graphs import datasets as ds
from repro.graphs.graph import WeightedGraph

ALPHA = 0.2  # the paper's teleport probability in all experiments


# --------------------------------------------------------------- Table 2
def table2_rows(spark: SparkSession, keys=ds.ALL_KEYS) -> pd.DataFrame:
    """Measured Table-2 metadata for the dataset-lites, next to the paper's."""
    rows = []
    for key in keys:
        g = ds.load(spark, key)
        st = g.stats()
        paper = ds.PAPER_TABLE2[key]
        rows.append(
            {
                "dataset": key,
                "kind": ds.SPECS[key].kind,
                "n": st["n"],
                "m": st["m"],
                "mean_weight": round(st["mean_weight"], 2),
                "max_weight": round(st["max_weight"], 1),
                "cos2_phi": round(st["cos2_phi"], 3),
                "paper_n": paper["n"],
                "paper_m": paper["m"],
                "paper_mean_w": paper["mean_w"],
                "paper_max_w": paper["max_w"],
                "paper_cos2": paper["cos2"],
            }
        )
    return pd.DataFrame(rows)


# ------------------------------------------------- shared per-run evaluation
def _evaluate(graph: WeightedGraph, gt: np.ndarray, res, *, k: int = 50) -> dict:
    csr = graph.csr
    est = res.vector(graph.n)
    best_phi, best_size = M.sweep_conductance(csr, est / csr.deg)
    return {
        "l1_err": M.l1_error(est, gt),
        "max_add_err": M.max_add_err(est, gt),
        "norm_max_add_err": M.normalized_max_add_err(est, gt, csr.deg),
        "precision_norm": M.precision_at_k(est, gt, k=k, deg=csr.deg),
        "precision": M.precision_at_k(est, gt, k=k),
        "conductance": best_phi,
        "cluster_size": best_size,
        "work": res.cost.edge_touches,
        "pushes": res.cost.pushes,
        "walks": res.cost.walks,
        "supersteps": res.cost.supersteps,
        "wall_s": round(res.cost.wall_seconds, 3),
    }


# ----------------------------------------- Figs 4/7, 5/8, 6/9 (additive regime)
def additive_tradeoff(
    spark: SparkSession,
    graph: WeightedGraph,
    *,
    dataset: str,
    sources: list[int],
    rmax_grid=(1e-3, 1e-4, 1e-5),
    delta_grid=(1e-1, 1e-2, 1e-3),
    methods=("EdgePush-Add", "MAPPR", "MC", "FORA", "SpeedPPR"),
    seed: int = 0,
) -> pd.DataFrame:
    """Error/precision/conductance vs work for the five §6.1 methods.

    EdgePush-Add and MAPPR sweep the (r_max ↔ θ) grid; the Monte-Carlo
    family sweeps δ (with the paper's fixed ε_r = 0.5, p_f = 1/n).
    """
    rows = []
    gts = {s: ground_truth(graph.csr, s, alpha=ALPHA) for s in sources}
    for s in sources:
        gt = gts[s]

        def record(method, param_name, param, res):
            rows.append(
                {
                    "dataset": dataset,
                    "method": method,
                    "source": s,
                    "param": f"{param_name}={param:g}",
                    **_evaluate(graph, gt, res),
                }
            )

        for rmax in rmax_grid:
            if "EdgePush-Add" in methods:
                record(
                    "EdgePush-Add", "rmax", rmax,
                    edge_push(graph, s, alpha=ALPHA, mode="additive", tol=rmax),
                )
            if "MAPPR" in methods:
                record(
                    "MAPPR", "theta", rmax,
                    local_push(graph, s, alpha=ALPHA, theta=rmax),
                )
        for delta in delta_grid:
            if "MC" in methods:
                record(
                    "MC", "delta", delta,
                    monte_carlo(graph, s, alpha=ALPHA, delta=delta, seed=seed),
                )
            if "FORA" in methods:
                record(
                    "FORA", "delta", delta,
                    fora(graph, s, alpha=ALPHA, delta=delta, seed=seed),
                )
            if "SpeedPPR" in methods:
                record(
                    "SpeedPPR", "delta", delta,
                    speedppr(graph, s, alpha=ALPHA, delta=delta, seed=seed),
                )
    return pd.DataFrame(rows)


# -------------------------------------------- Figs 10/13, 14/15 (ℓ1 regime)
def l1_tradeoff(
    spark: SparkSession,
    graph: WeightedGraph,
    *,
    dataset: str,
    sources: list[int],
    eps_grid=(1e-1, 1e-2, 1e-3),
    iters_grid=(3, 5, 7, 9),
    scan_frac: float = 0.125,
) -> pd.DataFrame:
    """ℓ1-error vs work for EdgePush (scan-switched) vs PowForPush vs
    Power Method — the §6.2 comparison."""
    rows = []
    for s in sources:
        gt = ground_truth(graph.csr, s, alpha=ALPHA)

        def record(method, param_name, param, res):
            rows.append(
                {
                    "dataset": dataset,
                    "method": method,
                    "source": s,
                    "param": f"{param_name}={param:g}",
                    **_evaluate(graph, gt, res),
                }
            )

        for eps in eps_grid:
            record(
                "EdgePush", "eps", eps,
                edge_push(
                    graph, s, alpha=ALPHA, mode="l1", tol=eps, scan_frac=scan_frac
                ),
            )
            record(
                "PowForPush", "eps", eps,
                pow_for_push(
                    graph, s, alpha=ALPHA, theta=eps / graph.norm_a(),
                    scan_frac=scan_frac,
                ),
            )
        for iters in iters_grid:
            record("PowerMethod", "iters", iters, power_method(graph, s, alpha=ALPHA, iters=iters))
    return pd.DataFrame(rows)


# ----------------------------------------------- Figs 16/17 (unbalancedness)
def unbalance_sweep(
    spark: SparkSession,
    *,
    n: int = 300,
    sources: int = 2,
    rmax_grid=(1e-4, 1e-5),
    eps_grid=(1e-1, 1e-2),
    seed: int = 0,
) -> pd.DataFrame:
    """EdgePush vs LocalPush on the four §6.3 affinity graphs.

    Reports each graph's cos²φ and Σn_v·cos²φ_v/2m beside the measured
    work gap; the paper's claim is the gap shrinks as weights balance.
    """
    from repro.graphs.affinity import (
        PAPER_ADD_FACTOR,
        PAPER_CONFIGS,
        PAPER_COS2,
        paper_affinity_graphs,
    )

    rows = []
    for i, (cfg, pdf) in enumerate(
        zip(PAPER_CONFIGS, paper_affinity_graphs(n, seed=seed))
    ):
        g = WeightedGraph.from_undirected_pandas(spark, pdf)
        csr = g.csr
        c2 = U.cos2_phi(csr)
        add_f = U.additive_unbalance_factor(csr)
        srcs = g.sample_sources(sources, seed=seed)
        for s in srcs:
            gt = ground_truth(csr, s, alpha=ALPHA)
            for rmax in rmax_grid:
                for method, res in (
                    ("EdgePush-Add", edge_push(g, s, alpha=ALPHA, mode="additive", tol=rmax)),
                    ("LocalPush", local_push(g, s, alpha=ALPHA, theta=rmax)),
                ):
                    rows.append(
                        {
                            "graph": f"affinity-{i+1}(k={cfg['kappa']})",
                            "regime": "additive",
                            "cos2_phi": round(c2, 3),
                            "add_factor": round(add_f, 3),
                            "paper_cos2": PAPER_COS2[i],
                            "paper_add_factor": PAPER_ADD_FACTOR[i],
                            "method": method,
                            "source": s,
                            "param": f"rmax={rmax:g}",
                            **_evaluate(g, gt, res),
                        }
                    )
            for eps in eps_grid:
                for method, res in (
                    ("EdgePush", edge_push(g, s, alpha=ALPHA, mode="l1", tol=eps)),
                    ("LocalPush", local_push(g, s, alpha=ALPHA, theta=eps / g.norm_a())),
                ):
                    rows.append(
                        {
                            "graph": f"affinity-{i+1}(k={cfg['kappa']})",
                            "regime": "l1",
                            "cos2_phi": round(c2, 3),
                            "add_factor": round(add_f, 3),
                            "paper_cos2": PAPER_COS2[i],
                            "paper_add_factor": PAPER_ADD_FACTOR[i],
                            "method": method,
                            "source": s,
                            "param": f"eps={eps:g}",
                            **_evaluate(g, gt, res),
                        }
                    )
    return pd.DataFrame(rows)


# ------------------------------------------------------ Table 1 (complexity)
def table1_complexity(
    spark: SparkSession,
    graphs: dict[str, WeightedGraph],
    *,
    eps: float = 1e-3,
    rmax: float = 1e-5,
    n_sources: int = 5,
    seed: int = 0,
    impl: str = "batch",
) -> pd.DataFrame:
    """Measured op counts vs the Table-1 predictions.

    For each graph: run LocalPush and EdgePush over degree-sampled
    sources, average the edge touches, and compare the measured
    EdgePush/LocalPush ratio with the predicted improvement factors
    (1-α)·cos²φ (ℓ1) and (1-α)/2m·Σn_v·cos²φ_v (additive).

    ``impl`` picks the schedule being measured. ``"batch"`` (default) uses
    the bulk-synchronous Spark implementations, where both algorithms
    amortize residues identically per superstep — the apples-to-apples
    measurement of the node- vs edge-granularity difference the theory
    bounds. ``"sequential"`` uses the faithful one-push-at-a-time
    references; note its FIFO edge scheduler splits mass into many small
    pushes on *balanced* graphs, so its measured EdgePush counts can
    approach the worst-case bound while LocalPush's stay far below theirs
    — an instructive scheduling artifact, not a violation of Table 1
    (which orders the bounds).
    """
    rows = []
    for name, g in graphs.items():
        csr = g.csr
        srcs = g.sample_sources(n_sources, seed=seed)
        t_l1 = th.theta_l1(csr, eps)
        t_add = th.theta_additive(csr, rmax)
        lp_l1 = ep_l1 = lp_add = ep_add = 0
        for s in srcs:
            if impl == "sequential":
                lp_l1 += sequential_local_push(
                    csr, s, alpha=ALPHA, theta=eps / csr.norm_a()
                ).cost.edge_touches
                ep_l1 += sequential_edge_push(
                    csr, s, t_l1, alpha=ALPHA
                ).cost.edge_touches
                lp_add += sequential_local_push(
                    csr, s, alpha=ALPHA, theta=rmax
                ).cost.edge_touches
                ep_add += sequential_edge_push(
                    csr, s, t_add, alpha=ALPHA
                ).cost.edge_touches
            else:
                lp_l1 += local_push(
                    g, s, alpha=ALPHA, theta=eps / csr.norm_a()
                ).cost.edge_touches
                ep_l1 += edge_push(
                    g, s, alpha=ALPHA, mode="l1", tol=eps
                ).cost.edge_touches
                lp_add += local_push(g, s, alpha=ALPHA, theta=rmax).cost.edge_touches
                ep_add += edge_push(
                    g, s, alpha=ALPHA, mode="additive", tol=rmax
                ).cost.edge_touches
        k = len(srcs)
        rows.append(
            {
                "graph": name,
                "n": csr.n,
                "2m": csr.nnz,
                "cos2_phi": round(U.cos2_phi(csr), 4),
                "lp_work_l1": lp_l1 // k,
                "ep_work_l1": ep_l1 // k,
                "measured_ratio_l1": round(ep_l1 / max(lp_l1, 1), 4),
                "predicted_ratio_l1": round(U.l1_improvement(csr, alpha=ALPHA), 4),
                "lp_work_add": lp_add // k,
                "ep_work_add": ep_add // k,
                "measured_ratio_add": round(ep_add / max(lp_add, 1), 4),
                "predicted_ratio_add": round(
                    U.additive_improvement(csr, alpha=ALPHA), 4
                ),
            }
        )
    return pd.DataFrame(rows)
