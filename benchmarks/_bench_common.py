"""Shared helpers for the per-table benchmarks.

Each benchmark runs one table builder end-to-end (workload generation,
blocking, simulated-LLM resolution, baselines, metric computation) at
``REPRO_BENCH_SCALE`` (default 1.0 = paper-size datasets), prints the
paper-vs-measured frame, and drops a CSV under ``benchmarks/results/``
for EXPERIMENTS.md.
"""
from __future__ import annotations

import os
from pathlib import Path

import pandas as pd

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))
SEED = int(os.environ.get("REPRO_BENCH_SEED", "0"))
RESULTS = Path(__file__).parent / "results"


def run_table(benchmark, fn, name: str, **kw):
    """Benchmark one table builder (single round) and publish output."""

    def _build():
        return fn(**kw)

    df = benchmark.pedantic(_build, rounds=1, iterations=1)
    RESULTS.mkdir(exist_ok=True)
    df.round(4).to_csv(RESULTS / f"{name}.csv", index=False)
    pd.set_option("display.width", 220)
    pd.set_option("display.max_columns", 40)
    print(f"\n== {name} (scale={kw.get('scale', SCALE)}) ==")
    print(df.round(3).to_string(index=False))
    return df
