"""Benchmark: T5 thread scalability (Fig 7+13).

Runs the corresponding table job in quick mode exactly once and prints
the table (captured into bench_output.txt; paper-vs-measured diff lives
in EXPERIMENTS.md).
"""
from jobs.table05_threads import run


def test_table05_threads(spark, benchmark):
    result = benchmark.pedantic(run, args=(spark,), kwargs={"quick": True}, rounds=1, iterations=1)
    assert len(result) > 0
