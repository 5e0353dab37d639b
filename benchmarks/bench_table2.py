"""Benchmark: reproduce Clustering vs pairwise (Table 2).

Run with ``pytest benchmarks/bench_table2.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table2(benchmark):
    """Clustering vs pairwise (Table 2)"""
    run_table(benchmark, tables.table2, "table2", **dict(scale=SCALE, seed=SEED))
