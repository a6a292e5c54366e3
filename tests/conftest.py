"""Test-scope Spark tuning.

The root conftest honours SPARK_SHUFFLE_PARTITIONS when the session is
created (which happens after all conftests import). The repro's graphs
are small (<= ~1M directed edges), so 8 shuffle partitions beats the
64-partition default by a wide margin on per-job overhead.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
