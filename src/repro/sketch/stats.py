"""Numeric column statistics and the numeric-overlap similarity (§3, §5).

The profiler keeps min/max/count/distinct statistics for numeric columns
(as in Aurum [31] and D3L [15]) and exposes the range-overlap similarity
both systems use. CMDL reuses exactly this measure on numeric columns
(the paper notes its ChEBI results are identical to Aurum's for that
reason), so the function lives in the shared substrate.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, functions as F


@dataclass(frozen=True)
class NumericStats:
    """Summary statistics for one numeric column DE."""

    col_id: str
    n: int
    n_distinct: int
    vmin: float
    vmax: float
    mean: float

    @property
    def span(self) -> float:
        return self.vmax - self.vmin


def numeric_stats_spark(values: DataFrame, *, id_col: str = "de_id",
                        value_col: str = "value") -> pd.DataFrame:
    """Distributed numeric profiling: (id, value) → one stats row per id."""
    out = (
        values.groupBy(F.col(id_col).alias("col_id"))
        .agg(
            F.count(value_col).alias("n"),
            F.countDistinct(value_col).alias("n_distinct"),
            F.min(value_col).alias("vmin"),
            F.max(value_col).alias("vmax"),
            F.avg(value_col).alias("mean"),
            F.avg((F.col(value_col) == F.floor(value_col)).cast("double"))
            .alias("frac_int"),
        )
    )
    return out.toPandas()


def range_overlap(amin: float, amax: float, bmin: float, bmax: float) -> float:
    """Overlap of [amin,amax] and [bmin,bmax] relative to the smaller span.

    1.0 when the smaller range is fully inside the larger; 0.0 when the
    ranges are disjoint. Point ranges compare by inclusion.
    """
    inter = min(amax, bmax) - max(amin, bmin)
    if inter < 0:
        return 0.0
    smaller = min(amax - amin, bmax - bmin)
    if smaller <= 0:  # at least one point range
        return 1.0 if max(amin, bmin) <= min(amax, bmax) else 0.0
    return float(min(1.0, inter / smaller))


def numeric_similarity(a: "NumericStats | pd.Series", b: "NumericStats | pd.Series") -> float:
    """Numeric-overlap similarity between two profiled numeric columns."""
    get = lambda s, k: getattr(s, k) if isinstance(s, NumericStats) else s[k]
    return range_overlap(get(a, "vmin"), get(a, "vmax"), get(b, "vmin"), get(b, "vmax"))
