"""Benchmark: reproduce Optimal factors per LLM (Table 9); GPT vs Llama (Table 10); Entity dispersion (Tables 11-13); Blocking ablation (Table 14); Few-shot learning (Table 17); Merging strategy (Table 18); Batch processing (Table 19).

Run with ``pytest benchmarks/bench_appendix.py --benchmark-only``; set
``REPRO_BENCH_SCALE`` to shrink the datasets (1.0 = paper size).
"""
from benchmarks._bench_common import SCALE, SEED, run_table

from repro.experiments import tables


def test_table9(benchmark):
    """Optimal factors per LLM (Table 9)"""
    run_table(benchmark, tables.table9, "table9", **dict(scale=SCALE, seed=SEED))

def test_table10(benchmark):
    """GPT vs Llama (Table 10)"""
    run_table(benchmark, tables.table10, "table10", **dict(scale=SCALE, seed=SEED))

def test_table11_12_13(benchmark):
    """Entity dispersion (Tables 11-13)"""
    run_table(benchmark, tables.table11_12_13, "table11_12_13", **dict(scale=SCALE, seed=SEED))

def test_table14(benchmark):
    """Blocking ablation (Table 14)"""
    run_table(benchmark, tables.table14, "table14", **dict(scale=SCALE, seed=SEED))

def test_table17(benchmark):
    """Few-shot learning (Table 17)"""
    run_table(benchmark, tables.table17, "table17", **dict(scale=SCALE, seed=SEED))

def test_table18(benchmark):
    """Merging strategy (Table 18)"""
    run_table(benchmark, tables.table18, "table18", **dict(scale=SCALE, seed=SEED))

def test_table19(benchmark):
    """Batch processing (Table 19)"""
    run_table(benchmark, tables.table19, "table19", **dict(scale=SCALE, seed=SEED))
