"""Benchmark helpers: run-once pedantic wrapper + result persistence.

Every benchmark reproduces one table/figure-group of the paper: it runs
the corresponding harness once (``rounds=1`` — these are end-to-end
experiment sweeps, not micro-benchmarks), prints the result rows, and
writes them to ``bench_results/<name>.csv`` for EXPERIMENTS.md.
"""
from __future__ import annotations

from pathlib import Path

import pandas as pd

RESULTS_DIR = Path(__file__).resolve().parent.parent / "bench_results"


def run_and_save(benchmark, name: str, fn) -> pd.DataFrame:
    df = benchmark.pedantic(fn, rounds=1, iterations=1)
    RESULTS_DIR.mkdir(exist_ok=True)
    out = RESULTS_DIR / f"{name}.csv"
    df.to_csv(out, index=False)
    pd.set_option("display.width", 240)
    pd.set_option("display.max_columns", 60)
    pd.set_option("display.max_rows", 400)
    print(f"\n===== {name} =====")
    print(df.to_string(index=False))
    print(f"saved -> {out}")
    return df
