"""Materialise collected value combinations and re-verify coverage.

The paper's GREEDY returns *value combinations* to collect, counting a
pattern as resolved once one matching combination is acquired. To make
Problem 2's guarantee (maximum covered level ≥ λ) mechanically
checkable, each collected combination is replicated ``tau`` times —
enough to lift every pattern it matches to the threshold regardless of
its prior deficit — appended to the dataset as a Spark union, and MUP
identification is re-run on the result.
"""
from __future__ import annotations

from typing import List, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex
from repro.core.deepdiver import mups_deepdiver
from repro.core.patterns import Pattern


def combos_to_pandas(
    combos: Sequence[Pattern], attrs: Sequence[str], tau: int
) -> pd.DataFrame:
    """Each collected combination replicated τ times, as new tuples."""
    rows: List[Sequence[int]] = [c for c in combos for _ in range(tau)]
    return pd.DataFrame(rows, columns=list(attrs)) if rows else pd.DataFrame(
        columns=list(attrs)
    )


def append_collected(
    spark: SparkSession,
    df: DataFrame,
    combos: Sequence[Pattern],
    attrs: Sequence[str],
    tau: int,
) -> DataFrame:
    """Union the collected tuples into the dataset (distributed path)."""
    pdf = combos_to_pandas(combos, attrs, tau)
    if pdf.empty:
        return df
    extra = spark.createDataFrame(pdf)
    return df.select(*attrs).unionByName(extra)


def verify_covered_level(
    df: DataFrame, attrs: Sequence[str], cards: Sequence[int], tau: int
) -> int:
    """Recompute MUPs over ``df`` and return the maximum covered level."""
    idx = CoverageIndex.from_spark(df, attrs, cards)
    mups = mups_deepdiver(idx, tau)
    return pt.max_covered_level(mups, len(list(cards)))
