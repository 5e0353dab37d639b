"""Benchmark: reproduce ER vs attribute count (Table 6).

Run with ``pytest benchmarks/bench_table6.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table6(benchmark):
    """ER vs attribute count (Table 6)"""
    run_table(benchmark, tables.table6, "table6", **dict(scale=SCALE, seed=SEED))
