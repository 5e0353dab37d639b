"""Benchmark: reproduce Hierarchy level counts (Table 3).

Run with ``pytest benchmarks/bench_table3.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table3(benchmark):
    """Hierarchy level counts (Table 3)"""
    run_table(benchmark, tables.table3, "table3", **dict(scale=SCALE, seed=SEED))
