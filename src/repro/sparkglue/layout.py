"""Flood's learned layout as a Spark partitioning/sort scheme.

This is the distributed realization of §3.1 (per the reproduction band:
"a custom partitioning/sort scheme applied per-partition then scanned via
DataFrame filters with data skipping"):

1. :func:`learn_boundaries` — per grid dimension, equi-mass column
   boundaries from a sample (the flattening CDF of §5.1 evaluated at
   k/c_i); skipping flattening yields equal-width boundaries.
2. :func:`apply_flood_layout` — a pandas UDF assigns each row its cell id
   (np.searchsorted against the broadcast boundaries, mixed-radix over
   grid dims), then ``repartitionByRange(cell_id)`` +
   ``sortWithinPartitions(cell_id, sort_dim)`` materializes exactly
   Flood's storage order: cells contiguous, sort-dim ordered within.

The resulting DataFrame is clustered on ``cell_id``; range predicates on
it are pushed into the in-memory columnar scan where batch-level min/max
stats skip non-matching batches (Spark's cached-relation pruning), the
DataFrame analogue of Flood's cell table.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import LongType

from repro.indexes.flood import Layout

CELL_COL = "__flood_cell"


@dataclass
class SparkFloodLayout:
    """Layout + learned boundaries + the column names they index."""

    layout: Layout
    dim_cols: list[str]                    # dataframe column per dim index
    boundaries: dict[int, np.ndarray]      # grid dim -> ascending thresholds

    @property
    def sort_col(self) -> str:
        return self.dim_cols[self.layout.sort_dim]


def learn_boundaries(df: DataFrame, layout: Layout, dim_cols: list[str],
                     sample_rows: int = 50_000, seed: int = 0) -> SparkFloodLayout:
    """Equi-mass (flattened) or equal-width column boundaries per grid dim."""
    n = df.count()
    frac = min(1.0, sample_rows / max(n, 1))
    sample = df.select(*dim_cols).sample(frac, seed=seed).toPandas()
    boundaries: dict[int, np.ndarray] = {}
    for dim, c in zip(layout.grid_dims, layout.cols):
        col = sample[dim_cols[dim]].to_numpy(dtype=np.float64)
        if layout.flatten:
            qs = np.arange(1, c) / c
            b = np.quantile(col, qs) if c > 1 else np.empty(0)
        else:
            lo, hi = col.min(), col.max()
            b = lo + (hi - lo) * np.arange(1, c) / c
        boundaries[dim] = np.asarray(b, dtype=np.float64)
    return SparkFloodLayout(layout=layout, dim_cols=dim_cols, boundaries=boundaries)


def cell_id_expr(sfl: SparkFloodLayout):
    """Pandas UDF computing each row's mixed-radix cell id."""
    from pyspark.sql.functions import pandas_udf

    layout, boundaries = sfl.layout, sfl.boundaries
    grid_dims, cols = list(layout.grid_dims), list(layout.cols)
    bounds = [boundaries[dm] for dm in grid_dims]

    @pandas_udf(LongType())
    def _cell(*series: pd.Series) -> pd.Series:
        ids = np.zeros(len(series[0]), dtype=np.int64)
        stride = 1
        for s, b, c in zip(reversed(series), reversed(bounds), reversed(cols)):
            col_idx = np.searchsorted(b, s.to_numpy(dtype=np.float64), side="right")
            ids += np.clip(col_idx, 0, c - 1) * stride
            stride *= c
        return pd.Series(ids)

    return _cell(*[F.col(sfl.dim_cols[dm]) for dm in grid_dims])


def apply_flood_layout(df: DataFrame, sfl: SparkFloodLayout,
                       num_partitions: int | None = None) -> DataFrame:
    """Materialize Flood's storage order as a Spark DataFrame.

    Rows gain ``__flood_cell``; partitions hold contiguous cell-id ranges
    (repartitionByRange) and rows within each partition are sorted by
    (cell id, sort dim) — Fig 2's serialization order, distributed.
    """
    with_cell = df.withColumn(CELL_COL, cell_id_expr(sfl))
    parted = (
        with_cell.repartitionByRange(num_partitions, CELL_COL)
        if num_partitions
        else with_cell.repartitionByRange(CELL_COL)
    )
    return parted.sortWithinPartitions(CELL_COL, sfl.sort_col)


def cell_runs_for_query(sfl: SparkFloodLayout,
                        bounds: dict[str, tuple[float, float]]) -> list[tuple[int, int]]:
    """Projection (§3.2.1) on the driver: contiguous [lo, hi] cell-id runs
    intersecting the query rectangle. ``bounds`` maps column name -> range."""
    layout, boundaries = sfl.layout, sfl.boundaries
    per_dim: list[np.ndarray] = []
    for dim, c in zip(layout.grid_dims, layout.cols):
        name = sfl.dim_cols[dim]
        if name in bounds:
            lo, hi = bounds[name]
            b = boundaries[dim]
            clo = int(np.clip(np.searchsorted(b, lo, side="right"), 0, c - 1))
            chi = int(np.clip(np.searchsorted(b, hi, side="right"), 0, c - 1))
            per_dim.append(np.arange(clo, chi + 1))
        else:
            per_dim.append(np.arange(c))
    if not per_dim:
        return [(0, 0)]
    strides = np.ones(len(per_dim), dtype=np.int64)
    for i in range(len(per_dim) - 2, -1, -1):
        strides[i] = strides[i + 1] * layout.cols[i + 1]
    mesh = np.meshgrid(*[g * s for g, s in zip(per_dim, strides)], indexing="ij")
    cells = np.sort(np.asarray(sum(mesh)).ravel())
    runs: list[tuple[int, int]] = []
    run_s = prev = int(cells[0])
    for cid in cells[1:]:
        cid = int(cid)
        if cid == prev + 1:
            prev = cid
            continue
        runs.append((run_s, prev))
        run_s = prev = cid
    runs.append((run_s, prev))
    return runs
