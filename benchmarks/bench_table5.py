"""Benchmark: reproduce Optimal factors vs attributes (Table 5).

Run with ``pytest benchmarks/bench_table5.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table5(benchmark):
    """Optimal factors vs attributes (Table 5)"""
    run_table(benchmark, tables.table5, "table5", **dict(scale=SCALE, seed=SEED))
