"""spark-submit entrypoints, one per reproduced table (importable by benchmarks)."""
