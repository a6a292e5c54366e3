"""Benchmark: T3 PAR vs SEQ speedups (Fig 4+5).

Runs the corresponding table job in quick mode exactly once and prints
the table (captured into bench_output.txt; paper-vs-measured diff lives
in EXPERIMENTS.md).
"""
from jobs.table03_speedups import run


def test_table03_speedups(spark, benchmark):
    result = benchmark.pedantic(run, args=(spark,), kwargs={"quick": True}, rounds=1, iterations=1)
    assert len(result) > 0
