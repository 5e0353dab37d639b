"""Benchmark: reproduce ER vs attribute types (Table 7).

Run with ``pytest benchmarks/bench_table7.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table7(benchmark):
    """ER vs attribute types (Table 7)"""
    run_table(benchmark, tables.table7, "table7", **dict(scale=SCALE, seed=SEED))
