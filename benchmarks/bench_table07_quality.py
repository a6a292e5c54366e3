"""Benchmark: T7 precision/recall vs ground truth (Fig 9+14).

Runs the corresponding table job in quick mode exactly once and prints
the table (captured into bench_output.txt; paper-vs-measured diff lives
in EXPERIMENTS.md).
"""
from jobs.table07_quality import run


def test_table07_quality(spark, benchmark):
    result = benchmark.pedantic(run, args=(spark,), kwargs={"quick": True}, rounds=1, iterations=1)
    assert len(result) > 0
