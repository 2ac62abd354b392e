"""EdgePush — the paper's contribution — as a distributed batch algorithm.

Algorithm 2 pushes one *edge* at a time, picked by the two-level structure
of §4.3. On a dataflow engine we run the bulk-synchronous decomposition:
each superstep simultaneously pushes **every** candidate edge
``C = {⟨u,v⟩ : R_uv ≥ θ(u,v)}``. A pushed edge transfers its pre-superstep
residue ``R_uv`` into v's income; the income a node receives feeds the
residues of its out-edges in the *next* superstep. The invariant proof
(Lemma 2 / Appendix A.4) holds for transferring any amount ``y ≤ R_uv``,
so the batch schedule preserves the invariant and the terminal condition
``R_uv < θ(u,v)`` for all edges yields exactly the paper's error bounds
(Lemmas 4–5, Theorems 2–3).

State is the edge-level residue DataFrame ``(src, dst, p, theta, r)`` plus
the node-income vector q; the estimate is ``π̂ = α·q``. Work accounting:
each edge push costs O(1) — one edge touch — which is precisely the
quantity Lemma 3 bounds.

``scan_frac`` mirrors the §6.2 switching technique: when the candidate set
exceeds ``scan_frac · 2m`` edges, the superstep pushes *all* edges with
r > 0 (sequential scan over the edge array) instead of only candidates.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.power import PPRResult
from repro.core.runtime import CostStats, few_shuffle_partitions, state_checkpoint
from repro.core.thresholds import thresholds_df
from repro.graphs.graph import WeightedGraph


def edge_push(
    graph: WeightedGraph,
    source: int,
    *,
    alpha: float = 0.2,
    mode: str = "l1",
    tol: float = 1e-4,
    thresholds: DataFrame | None = None,
    scan_frac: float | None = None,
    max_supersteps: int = 500,
    return_residue: bool = False,
) -> PPRResult | tuple[PPRResult, DataFrame]:
    """Approximate SSPPR by batch EdgePush.

    ``mode``/``tol`` pick the per-edge thresholds: ``("l1", ε)`` uses
    Theorem 2 (ℓ1-error ≤ ε), ``("additive", r_max)`` uses Theorem 3
    (normalized additive error ≤ r_max), ``("uniform", θ)`` is the untuned
    ablation. A prebuilt ``thresholds`` DataFrame (from
    :func:`repro.core.thresholds.thresholds_df`) overrides them — build it
    once when sweeping sources.

    With ``return_residue`` the terminal edge state ``(src, dst, p, theta,
    r)`` is also returned for invariant tests.
    """
    spark = graph.spark
    if thresholds is None:
        thresholds = thresholds_df(graph, mode=mode, tol=tol)
    two_m = graph.num_directed_edges()
    with few_shuffle_partitions(spark):
        # initial residues: R_sv = (1-α)·A_sv/d(s) on the source's out-edges
        edges = thresholds.select(
            "src",
            "dst",
            "p",
            "theta",
            F.when(F.col("src") == source, (1.0 - alpha) * F.col("p"))
            .otherwise(0.0)
            .alias("r"),
        )
        edges = state_checkpoint(edges)
        # node income q; π̂ = α·q
        q = graph.degrees.select(
            "node", F.when(F.col("node") == source, 1.0).otherwise(0.0).alias("q")
        )
        q = state_checkpoint(q)
        cost = CostStats().start()
        for _ in range(max_supersteps):
            # the strict r > 0 guard makes zero residues never eligible even
            # if a threshold degenerates; pushing zero mass is a no-op
            is_cand = (F.col("r") >= F.col("theta")) & (F.col("r") > 0)
            agg = edges.agg(
                F.sum(is_cand.cast("long")).alias("n_cand"),
                F.sum((F.col("r") > 0).cast("long")).alias("n_nz"),
            ).collect()[0]
            if not agg["n_cand"]:
                break
            scan = scan_frac is not None and agg["n_cand"] > scan_frac * two_m
            push_cond = (F.col("r") > 0) if scan else is_cand
            pushes = agg["n_nz"] if scan else agg["n_cand"]

            inc = (
                edges.filter(push_cond)
                .groupBy("dst")
                .agg(F.sum("r").alias("inc"))
                .withColumnRenamed("dst", "inode")
            )
            q = (
                q.join(inc, q.node == inc.inode, "left")
                .select(
                    "node",
                    (F.col("q") + F.coalesce(F.col("inc"), F.lit(0.0))).alias("q"),
                )
            )
            edges = (
                edges.join(inc, edges.src == inc.inode, "left")
                .select(
                    "src",
                    "dst",
                    "p",
                    "theta",
                    (
                        F.when(push_cond, 0.0).otherwise(F.col("r"))
                        + (1.0 - alpha)
                        * F.coalesce(F.col("inc"), F.lit(0.0))
                        * F.col("p")
                    ).alias("r"),
                )
            )
            edges = state_checkpoint(edges)
            q = state_checkpoint(q)
            cost.add_superstep(pushes=pushes, edge_touches=pushes)
        cost.stop()
        est = (
            q.filter(F.col("q") > 0)
            .select("node", (F.lit(alpha) * F.col("q")).alias("est"))
            .toPandas()
        )
    result = PPRResult(estimate=est, cost=cost)
    return (result, edges) if return_residue else result
