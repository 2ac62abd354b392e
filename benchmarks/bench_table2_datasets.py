"""Benchmark/repro of Table 2: dataset metadata (n, m, weights, cos²φ)
for all eight dataset-lites, next to the paper's published values."""
from repro.analysis.experiments import table2_rows
from repro.graphs.datasets import ALL_KEYS

from ._util import run_and_save


def test_table2_datasets(benchmark, spark):
    df = run_and_save(
        benchmark, "table2_datasets", lambda: table2_rows(spark, keys=ALL_KEYS)
    )
    assert len(df) == 8
    assert (df["cos2_phi"] > 0).all()
