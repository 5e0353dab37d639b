"""Benchmark: reproduce Dataset statistics (Table 1).

Run with ``pytest benchmarks/bench_table1.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table1(benchmark):
    """Dataset statistics (Table 1)"""
    run_table(benchmark, tables.table1, "table1", **dict(scale=SCALE))
