"""Benchmark: T4 rMAT scaling (Fig 6).

Runs the corresponding table job in quick mode exactly once and prints
the table (captured into bench_output.txt; paper-vs-measured diff lives
in EXPERIMENTS.md).
"""
from jobs.table04_rmat_scaling import run


def test_table04_rmat(spark, benchmark):
    result = benchmark.pedantic(run, args=(spark,), kwargs={"quick": True}, rounds=1, iterations=1)
    assert len(result) > 0
