"""Benchmark: reproduce MDG ablation (Tables 8+15).

Run with ``pytest benchmarks/bench_table8.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table8(benchmark):
    """MDG ablation (Tables 8+15)"""
    run_table(benchmark, tables.table8, "table8", **dict(scale=SCALE, seed=SEED))
