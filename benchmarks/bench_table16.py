"""Benchmark: reproduce PLM comparison (Appendix Table 16).

Run with ``pytest benchmarks/bench_table16.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table16(benchmark):
    """PLM comparison (Appendix Table 16)"""
    run_table(benchmark, tables.table16, "table16", **dict(scale=SCALE, seed=SEED))
