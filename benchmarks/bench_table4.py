"""Benchmark: reproduce State-of-the-art comparison (Table 4).

Run with ``pytest benchmarks/bench_table4.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table4(benchmark):
    """State-of-the-art comparison (Table 4)"""
    run_table(benchmark, tables.table4, "table4", **dict(scale=SCALE, seed=SEED))
