"""Shared utilities for the table-reproduction harnesses."""
from __future__ import annotations

import time
from typing import Callable, Sequence

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def timed(fn: Callable[[], object]) -> tuple[object, float]:
    """Run ``fn`` and return (result, wall seconds)."""
    t0 = time.perf_counter()
    out = fn()
    return out, time.perf_counter() - t0


def force(df: DataFrame) -> float:
    """Fully evaluate every numeric column of ``df`` (defeats column pruning).

    Returns the grand total so the work cannot be optimised away.
    """
    nums = [f.name for f in df.schema.fields if f.dataType.typeName() in
            ("double", "float", "integer", "long", "short", "byte")]
    if not nums:
        return float(df.count())
    row = df.select([F.sum(F.col(c)).alias(c) for c in nums]).collect()[0]
    return float(sum(v for v in row if v is not None))


def print_table(title: str, headers: Sequence[str], rows: Sequence[Sequence[object]]) -> None:
    """Print rows in the shape the paper's table reports them."""
    print(f"\n== {title} ==")
    widths = [max(len(str(h)), *(len(_fmt(r[i])) for r in rows)) for i, h in enumerate(headers)]
    print("  ".join(str(h).rjust(w) for h, w in zip(headers, widths)))
    for r in rows:
        print("  ".join(_fmt(v).rjust(w) for v, w in zip(r, widths)))


def _fmt(v: object) -> str:
    if isinstance(v, float):
        return f"{v:.2f}"
    return str(v)
