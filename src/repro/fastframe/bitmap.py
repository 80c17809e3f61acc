"""Block-based bitmap indexes over categorical attributes (paper §4).

For a categorical column, the index records for every (value, block)
pair whether the block contains at least one row with that value —
exactly the information FastFrame's active scanning needs to decide
whether a block can contribute tuples to an active group. Built with a
single Spark ``distinct`` aggregation per column and materialized as a
dense NumPy boolean matrix ``[n_values, n_blocks]`` on the driver
(tens of MB at benchmark scale).

Composite GROUP BY keys (e.g. F-q6's ``DayOfWeek, Origin``) use the
conjunction of the per-column bitmaps — a superset of the blocks that
contain the exact pair, which is what a real per-column bitmap index
gives you (occasional false-positive block fetches, never false
negatives).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Sequence, Tuple

import numpy as np
from pyspark.sql import functions as F

from repro.fastframe.scramble import Scramble


@dataclass
class ColumnBitmap:
    """Presence bitmap of each distinct value of one column, per block."""

    column: str
    values: List  # sorted distinct values
    matrix: np.ndarray  # bool [n_values, n_blocks]

    def row(self, value) -> np.ndarray:
        try:
            idx = self.values.index(value)
        except ValueError:
            raise KeyError(
                f"value {value!r} not present in column {self.column!r}"
            ) from None
        return self.matrix[idx]


def build_column_bitmap(scramble: Scramble, column: str) -> ColumnBitmap:
    """One Spark aggregation: distinct (value, block_id) pairs -> matrix."""
    pdf = (
        scramble.df.select(F.col(column).alias("v"), "block_id")
        .distinct()
        .toPandas()
    )
    values = sorted(pdf["v"].unique().tolist())
    index = {v: i for i, v in enumerate(values)}
    matrix = np.zeros((len(values), scramble.n_blocks), dtype=bool)
    matrix[
        pdf["v"].map(index).to_numpy(), pdf["block_id"].to_numpy()
    ] = True
    return ColumnBitmap(column=column, values=values, matrix=matrix)


def get_column_bitmap(scramble: Scramble, column: str) -> ColumnBitmap:
    """Cached accessor — the index is built once per scramble."""
    key = ("bitmap", column)
    if key not in scramble.prep_cache:
        scramble.prep_cache[key] = build_column_bitmap(scramble, column)
    return scramble.prep_cache[key]


def group_domain(scramble: Scramble, group_cols: Sequence[str]) -> List[Tuple]:
    """Distinct group keys present in the (unfiltered) relation.

    This is the "number of aggregate views (or an upper bound)" that the
    per-query confidence budget is divided by, and the row universe of
    the per-group bitmap matrix.
    """
    key = ("domain", tuple(group_cols))
    if key not in scramble.prep_cache:
        pdf = scramble.df.select(*group_cols).distinct().toPandas()
        scramble.prep_cache[key] = sorted(
            tuple(r) for r in pdf.itertuples(index=False, name=None)
        )
    return scramble.prep_cache[key]


def group_bitmap_matrix(
    scramble: Scramble, group_cols: Sequence[str]
) -> Tuple[List[Tuple], np.ndarray]:
    """Per-group presence matrix [n_groups, n_blocks].

    Single columns use the column bitmap directly; composite keys AND
    the per-column bitmaps (conservative superset, see module doc).
    """
    key = ("group_matrix", tuple(group_cols))
    if key in scramble.prep_cache:
        return scramble.prep_cache[key]
    domain = group_domain(scramble, group_cols)
    col_bitmaps: Dict[str, ColumnBitmap] = {
        c: get_column_bitmap(scramble, c) for c in group_cols
    }
    matrix = np.ones((len(domain), scramble.n_blocks), dtype=bool)
    for j, c in enumerate(group_cols):
        bm = col_bitmaps[c]
        idx = {v: i for i, v in enumerate(bm.values)}
        rows = np.array([idx[g[j]] for g in domain], dtype=np.int64)
        matrix &= bm.matrix[rows]
    scramble.prep_cache[key] = (domain, matrix)
    return domain, matrix
