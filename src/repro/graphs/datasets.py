"""Synthetic stand-ins for the paper's eight datasets (Table 2).

The originals (YouTube … Spotify, up to 3.8B edges) are not available
offline, so each gets a deterministic laptop-scale "lite" that preserves
the property EdgePush's advantage depends on — the edge-weight
unbalancedness profile:

- the four *motif-based* datasets (YT, LJ, IC, OL) are power-law graphs
  reweighted by clique3 (triangle) counts, exactly the paper's
  preprocessing, so their cos²φ is emergent (recorded vs. the paper's);
- the four *real weighted* datasets (TA, TH, BC, SP) are power-law graphs
  with i.i.d. log-normal weights tuned to the dataset's **published
  cos²φ** (σ² = 4·ln(1/cos²φ); see generators.lognormal_weights).

``PAPER_TABLE2`` records the original Table-2 rows for EXPERIMENTS.md.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from pyspark.sql import SparkSession

from repro.graphs import generators as gen
from repro.graphs.graph import WeightedGraph
from repro.graphs.motif import motif_weighted_graph


# paper's Table 2: n, m, mean weight, max weight, cos²φ
PAPER_TABLE2 = {
    "YT": dict(n=1_138_499, m=2_795_228, mean_w=6.6, max_w=4_034, cos2=0.65),
    "LJ": dict(n=4_847_571, m=71_062_058, mean_w=24, max_w=4_445, cos2=0.51),
    "IC": dict(n=7_414_768, m=295_191_370, mean_w=1_221, max_w=178_448, cos2=0.31),
    "OL": dict(n=3_072_441, m=202_392_682, mean_w=18, max_w=9_145, cos2=0.69),
    "TA": dict(n=49_945, m=8_294_604, mean_w=13, max_w=469_258, cos2=0.27),
    "TH": dict(n=2_321_767, m=42_012_344, mean_w=1.1, max_w=546, cos2=0.97),
    "BC": dict(n=595_753, m=1_773_544, mean_w=5.2, max_w=17_165, cos2=0.5),
    "SP": dict(n=3_604_308, m=3_854_964_026, mean_w=8.6, max_w=2_878_970, cos2=0.29),
}

MOTIF_KEYS = ("YT", "LJ", "IC", "OL")
REAL_KEYS = ("TA", "TH", "BC", "SP")
ALL_KEYS = MOTIF_KEYS + REAL_KEYS


@dataclass(frozen=True)
class DatasetSpec:
    key: str
    kind: str  # "motif" | "real"
    build: Callable[[SparkSession], WeightedGraph]


def _motif(n: int, m: int, exponent: float, seed: int):
    def build(spark: SparkSession) -> WeightedGraph:
        base = WeightedGraph.from_undirected_pandas(
            spark, gen.powerlaw_graph(n, m, exponent=exponent, seed=seed)
        )
        return motif_weighted_graph(spark, base)

    return build


def _real(n: int, m: int, exponent: float, target_cos2: float, seed: int):
    def build(spark: SparkSession) -> WeightedGraph:
        topo = gen.powerlaw_graph(n, m, exponent=exponent, seed=seed)
        return WeightedGraph.from_undirected_pandas(
            spark, gen.lognormal_weights(topo, target_cos2=target_cos2, seed=seed)
        )

    return build


SPECS: dict[str, DatasetSpec] = {
    "YT": DatasetSpec("YT", "motif", _motif(1200, 6000, 0.8, seed=101)),
    "LJ": DatasetSpec("LJ", "motif", _motif(1200, 12000, 0.9, seed=102)),
    "IC": DatasetSpec("IC", "motif", _motif(800, 16000, 1.0, seed=103)),
    "OL": DatasetSpec("OL", "motif", _motif(1000, 12000, 0.7, seed=104)),
    "TA": DatasetSpec("TA", "real", _real(600, 12000, 0.8, 0.27, seed=105)),
    "TH": DatasetSpec("TH", "real", _real(1500, 12000, 0.8, 0.97, seed=106)),
    "BC": DatasetSpec("BC", "real", _real(900, 3000, 0.9, 0.5, seed=107)),
    "SP": DatasetSpec("SP", "real", _real(800, 20000, 0.8, 0.29, seed=108)),
}

_CACHE: dict[str, WeightedGraph] = {}


def load(spark: SparkSession, key: str) -> WeightedGraph:
    """Build (once per process) and return the lite dataset for ``key``."""
    if key not in _CACHE:
        _CACHE[key] = SPECS[key].build(spark)
    return _CACHE[key]
