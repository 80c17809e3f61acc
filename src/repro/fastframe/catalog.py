"""Catalog metadata: range bounds for continuous columns (paper §2.2.1).

FastFrame "stores the minimum and maximum values in a catalog, to be
used as the range bounds a and b for the desired range-based error
bounder" — inferred at load time via a single Spark aggregation. The
bounders only require ``[a, b] ⊇ [MIN, MAX]``; we store the exact
MIN/MAX, which is the tightest legal choice and what the paper does.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, Tuple

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import NumericType


@dataclass
class Catalog:
    """Per-column [a, b] range bounds plus the relation size."""

    ranges: Dict[str, Tuple[float, float]] = field(default_factory=dict)
    n_rows: int = 0

    def bounds(self, column: str) -> Tuple[float, float]:
        if column not in self.ranges:
            raise KeyError(
                f"no catalog range bounds for column {column!r}; "
                f"known: {sorted(self.ranges)}"
            )
        return self.ranges[column]


def build_catalog(df: DataFrame) -> Catalog:
    """One Spark pass: COUNT(*) plus MIN/MAX of every numeric column."""
    numeric = [
        f.name for f in df.schema.fields if isinstance(f.dataType, NumericType)
    ]
    aggs = [F.count(F.lit(1)).alias("_n")]
    for c in numeric:
        aggs.append(F.min(c).cast("double").alias(f"_min_{c}"))
        aggs.append(F.max(c).cast("double").alias(f"_max_{c}"))
    row = df.agg(*aggs).collect()[0]
    return Catalog(
        ranges={c: (row[f"_min_{c}"], row[f"_max_{c}"]) for c in numeric},
        n_rows=int(row["_n"]),
    )
