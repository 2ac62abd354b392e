"""Shared runtime helpers for the iterative dataflow algorithms.

Iterative DataFrame algorithms need two things a one-shot query does not:

- **lineage truncation** — each superstep derives the new state from the
  old one; without truncation Catalyst replans an ever-growing tree.
  :func:`state_checkpoint` eagerly ``localCheckpoint``s the state.
- **small shuffles** — the session default of 64 shuffle partitions is
  tuned for SF=0.1 OLAP scans, not for a 5k-row frontier updated dozens of
  times. :func:`few_shuffle_partitions` scopes a lower setting to the
  algorithm's loop and restores the session value afterwards (the session
  is shared with other tests).

:class:`CostStats` is the machine-independent work metric every algorithm
reports: the paper's Table 1 bounds exactly these counts (edge touches /
pushes), so shape comparisons in EXPERIMENTS.md use them alongside
wall-clock.
"""
from __future__ import annotations

import time
from contextlib import contextmanager
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession


@dataclass
class CostStats:
    """Work + time accounting for one SSPPR query."""

    supersteps: int = 0
    pushes: int = 0  # #push operations (node pushes or edge pushes)
    edge_touches: int = 0  # total edges read/written — the Table-1 quantity
    walks: int = 0  # Monte-Carlo walks simulated
    walk_steps: int = 0  # Monte-Carlo steps taken (each touches one edge)
    wall_seconds: float = 0.0
    _t0: float = field(default=0.0, repr=False)

    def start(self) -> "CostStats":
        self._t0 = time.perf_counter()
        return self

    def stop(self) -> "CostStats":
        self.wall_seconds = time.perf_counter() - self._t0
        return self

    def add_superstep(self, *, pushes: int, edge_touches: int) -> None:
        self.supersteps += 1
        self.pushes += int(pushes)
        self.edge_touches += int(edge_touches)

    def add_walks(self, *, walks: int, steps: int) -> None:
        self.walks += int(walks)
        self.walk_steps += int(steps)
        self.edge_touches += int(steps)

    def merged(self, other: "CostStats") -> "CostStats":
        return CostStats(
            supersteps=self.supersteps + other.supersteps,
            pushes=self.pushes + other.pushes,
            edge_touches=self.edge_touches + other.edge_touches,
            walks=self.walks + other.walks,
            walk_steps=self.walk_steps + other.walk_steps,
            wall_seconds=self.wall_seconds + other.wall_seconds,
        )


@contextmanager
def few_shuffle_partitions(spark: SparkSession, k: int = 8):
    """Temporarily lower ``spark.sql.shuffle.partitions`` for a tight loop."""
    key = "spark.sql.shuffle.partitions"
    old = spark.conf.get(key)
    spark.conf.set(key, str(k))
    try:
        yield
    finally:
        spark.conf.set(key, old)


def state_checkpoint(df: DataFrame) -> DataFrame:
    """Materialize and truncate lineage of per-superstep state."""
    return df.localCheckpoint(eager=True)
