"""Shared test fixtures/builders: small deterministic graphs.

Unit tests run on graphs with n ≤ ~200 so that iterative Spark loops stay
fast and the numpy ground truth is exact for comparison purposes.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.graphs import generators as gen
from repro.graphs.graph import WeightedGraph


def build(spark, pdf: pd.DataFrame) -> WeightedGraph:
    return WeightedGraph.from_undirected_pandas(spark, pdf)


def two_node(spark) -> WeightedGraph:
    return build(spark, pd.DataFrame({"src": [0], "dst": [1], "weight": [1.0]}))


def triangle(spark, *, weights=(1.0, 1.0, 1.0)) -> WeightedGraph:
    return build(
        spark,
        pd.DataFrame({"src": [0, 1, 0], "dst": [1, 2, 2], "weight": list(weights)}),
    )


def star(spark, n: int = 40) -> WeightedGraph:
    return build(spark, gen.star_bad_case(n))


def small_er(spark, *, n: int = 60, seed: int = 7) -> WeightedGraph:
    pdf = gen.er_graph(n, 0.12, seed=seed)
    return build(spark, gen.lognormal_weights(pdf, target_cos2=0.5, seed=seed))


def small_powerlaw(spark, *, n: int = 80, seed: int = 11) -> WeightedGraph:
    pdf = gen.powerlaw_graph(n, 240, exponent=0.8, seed=seed)
    return build(spark, gen.zipf_weights(pdf, alpha=1.2, seed=seed))


def small_unbalanced(spark, *, n: int = 48) -> WeightedGraph:
    return build(spark, gen.complete_unbalanced(n))


GRAPH_BUILDERS = {
    "two_node": two_node,
    "triangle": triangle,
    "star": star,
    "er_lognormal": small_er,
    "powerlaw_zipf": small_powerlaw,
    "complete_unbalanced": small_unbalanced,
}

_CACHE: dict[str, WeightedGraph] = {}


def get_graph(spark, name: str) -> WeightedGraph:
    """Memoized graph lookup — WeightedGraph is immutable, so sharing one
    instance (and its cached CSR/degrees) across tests is safe and keeps
    the session fast."""
    if name not in _CACHE:
        _CACHE[name] = GRAPH_BUILDERS[name](spark)
    return _CACHE[name]
