"""Benchmark: T1 graph suite sizes.

Runs the corresponding table job in quick mode exactly once and prints
the table (captured into bench_output.txt; paper-vs-measured diff lives
in EXPERIMENTS.md).
"""
from jobs.table01_graphs import run


def test_table01_graphs(spark, benchmark):
    result = benchmark.pedantic(run, args=(spark,), kwargs={"quick": True}, rounds=1, iterations=1)
    assert len(result) > 0
