"""Experiment harness helpers: timing records and table formatting.

Every ``jobs/tableNN_*.py`` builds a list of row dicts through these
helpers and prints the table the corresponding section of the paper
reports, so EXPERIMENTS.md can diff paper vs measured.
"""
from __future__ import annotations

import time
from typing import Callable

import pandas as pd


def timed(fn: Callable, *args, **kw):
    """Run ``fn`` returning (result, seconds)."""
    t0 = time.perf_counter()
    out = fn(*args, **kw)
    return out, time.perf_counter() - t0


def table(rows: list[dict], *, title: str, floatfmt: int = 4) -> pd.DataFrame:
    """Assemble rows into a DataFrame and print it as a markdown-ish table."""
    df = pd.DataFrame(rows)
    with pd.option_context(
        "display.max_columns", None, "display.width", 240, "display.float_format",
        lambda x: f"{x:.{floatfmt}g}",
    ):
        print(f"\n== {title} ==")
        print(df.to_string(index=False))
    return df
