"""Motif-based edge weighting (MAPPR preprocessing, §6 "Datasets").

The paper converts its four unweighted graphs to weighted ones by setting
each edge's weight to φ(e), the number of "clique3" motifs (triangles) the
edge participates in; edges with φ(e)=0 drop out of the motif graph.

Implemented with Spark SQL self-joins over the canonical (src < dst)
undirected edge table:

1. enumerate triangles a<b<c as (a,b)⋈(b,c)⋈(a,c);
2. each triangle contributes 1 to each of its three edges;
3. group-by edge to get φ(e).

The DuckDB oracle re-runs the same enumeration as SQL to check the counts.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.graph import WeightedGraph


def canonical_edges(graph_or_df) -> DataFrame:
    """One row per undirected edge with src < dst (weights dropped)."""
    df = graph_or_df.edges if isinstance(graph_or_df, WeightedGraph) else graph_or_df
    return df.filter(F.col("src") < F.col("dst")).select("src", "dst").distinct()


def triangles(edges: DataFrame) -> DataFrame:
    """All triangles (a, b, c) with a < b < c over a canonical edge table."""
    e1 = edges.select(F.col("src").alias("a"), F.col("dst").alias("b"))
    e2 = edges.select(F.col("src").alias("b"), F.col("dst").alias("c"))
    e3 = edges.select(F.col("src").alias("a"), F.col("dst").alias("c"))
    return e1.join(e2, "b").join(e3, ["a", "c"]).select("a", "b", "c")


def motif_weights(edges: DataFrame) -> DataFrame:
    """Per-edge triangle participation count φ(e) (canonical edges, φ>0)."""
    t = triangles(edges)
    sides = (
        t.select(F.col("a").alias("src"), F.col("b").alias("dst"))
        .unionAll(t.select(F.col("b").alias("src"), F.col("c").alias("dst")))
        .unionAll(t.select(F.col("a").alias("src"), F.col("c").alias("dst")))
    )
    return sides.groupBy("src", "dst").agg(
        F.count("*").cast("double").alias("weight")
    )


def motif_weighted_graph(spark: SparkSession, graph: WeightedGraph) -> WeightedGraph:
    """Reweight an (arbitrary) graph by clique3 counts, as MAPPR does.

    Nodes whose every edge has φ(e)=0 leave the graph; remaining node ids
    are remapped to stay contiguous (algorithms assume ids in [0, n)).
    """
    w = motif_weights(canonical_edges(graph)).toPandas()
    ids = sorted(set(w["src"]) | set(w["dst"]))
    remap = {old: new for new, old in enumerate(ids)}
    w["src"] = w["src"].map(remap)
    w["dst"] = w["dst"].map(remap)
    return WeightedGraph.from_undirected_pandas(spark, w, n=len(ids))
