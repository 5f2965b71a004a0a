"""Flood's layout optimization (§4.2, Algorithm 1).

For each candidate sort dimension, the remaining dims are ordered by
average workload selectivity and a descent search over the integer column
counts minimizes the cost model's Eq. 1 averaged over a sampled workload.
Each cost evaluation is closed-form: per-query statistics (N_c, N_s,
cell sizes, exact fractions) are *estimated from the query rectangle and
layout parameters* in flattened space — flattening equalizes column mass,
so a column range of width k covers ≈ k/c of the points along that
dimension (§4.2: no layout build, no sort, no query execution per step).

Column counts are integers, so the paper's "gradient descent search" is
realized as multiplicative coordinate descent: each grid dimension tries
×2, ×1.25, ×0.8, ×0.5 moves, improvements are kept, and the search stops
when no move helps (the standard discrete analogue).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.core.cost_model import CostModel
from repro.core.query import Query
from repro.indexes.base import selectivity_order
from repro.indexes.flood import Layout


@dataclass
class OptimizationResult:
    layout: Layout
    cost: float
    learn_time: float
    per_sort_dim_costs: dict[int, float]


def _flat_bounds(data_sample: np.ndarray, workload: list[Query]) -> np.ndarray:
    """(n_q, d, 2) CDF values of each query's endpoints per dimension.

    This is the "flatten the data sample and workload sample using RMIs
    trained on each dimension" step; the empirical CDF of the sample *is*
    the flattened coordinate.
    """
    n, d = data_sample.shape
    out = np.empty((len(workload), d, 2))
    for dim in range(d):
        col = np.sort(data_sample[:, dim])
        for qi, q in enumerate(workload):
            lo, hi = q.ranges[dim]
            out[qi, dim, 0] = (
                np.searchsorted(col, lo, side="left") / n if np.isfinite(lo) else 0.0
            )
            out[qi, dim, 1] = (
                np.searchsorted(col, hi, side="right") / n if np.isfinite(hi) else 1.0
            )
    return out


def _estimate_stats(n: int, flat: np.ndarray, filtered: np.ndarray,
                    order: list[int], cols: list[int]) -> np.ndarray:
    """Closed-form per-query statistics for a candidate layout.

    Fully vectorized over queries (this runs thousands of times inside
    the descent search); returns a feature matrix in
    :data:`repro.core.cost_model.FEATURES` order.
    """
    from repro.core.cost_model import FEATURES

    grid_dims, sort_dim = order[:-1], order[-1]
    total_cells = int(np.prod(cols, dtype=np.int64)) if cols else 1
    cell_sz = n / total_cells
    nq = flat.shape[0]
    n_cells = np.ones(nq)
    scan_frac = np.ones(nq)
    exact_frac = np.ones(nq)
    for dim, c in zip(grid_dims, cols):
        f = filtered[:, dim]
        clo = np.minimum((flat[:, dim, 0] * c).astype(np.int64), c - 1)
        chi = np.minimum((flat[:, dim, 1] * c).astype(np.int64), c - 1)
        span = (chi - clo + 1).astype(np.float64)
        n_cells *= np.where(f, span, c)
        scan_frac *= np.where(f, span / c, 1.0)
        # interior columns are exact along this dim
        exact_frac *= np.where(f, np.where(span > 2, (span - 2) / span, 0.0), 1.0)
    refined = filtered[:, sort_dim].astype(np.float64)
    sort_frac = np.where(
        refined > 0,
        np.maximum(flat[:, sort_dim, 1] - flat[:, sort_dim, 0], 1e-9),
        1.0,
    )
    n_scanned = np.maximum(1.0, n * scan_frac * sort_frac)
    pts_per_cell = n_scanned / np.maximum(1, n_cells)
    X = np.empty((nq, len(FEATURES)))
    X[:, 0] = n_cells
    X[:, 1] = n_scanned
    X[:, 2] = total_cells
    X[:, 3] = cell_sz
    X[:, 4] = cell_sz
    X[:, 5] = cell_sz
    X[:, 6] = filtered.sum(axis=1)
    X[:, 7] = pts_per_cell
    X[:, 8] = pts_per_cell
    X[:, 9] = exact_frac
    X[:, 10] = refined
    return X


def optimize_layout(data: np.ndarray, workload: list[Query], cost_model: CostModel,
                    sample_records: int = 10_000, sample_queries: int = 100,
                    max_cells: int | None = None, seed: int = 0,
                    flatten: bool = True) -> OptimizationResult:
    """Algorithm 1: best layout over d candidate sort dimensions."""
    t0 = time.perf_counter()
    rng = np.random.default_rng(seed)
    n, d = data.shape
    sample = (
        data[rng.choice(n, sample_records, replace=False)]
        if n > sample_records
        else data
    )
    wl = (
        [workload[i] for i in rng.choice(len(workload), sample_queries, replace=False)]
        if len(workload) > sample_queries
        else list(workload)
    )
    if not wl:
        raise ValueError("optimizer needs a non-empty workload")
    flat = _flat_bounds(sample, wl)
    filtered = np.zeros((len(wl), d), dtype=bool)
    for qi, q in enumerate(wl):
        filtered[qi, q.filtered_dims] = True
    if max_cells is None:
        max_cells = max(64, n // 8)
    sel = [int(x) for x in selectivity_order(data, wl)]

    def cost_of(order: list[int], cols: list[int]) -> float:
        stats = _estimate_stats(n, flat, filtered, order, cols)
        return float(cost_model.predict_time(stats).mean())

    best: tuple[float, Layout] | None = None
    per_sort: dict[int, float] = {}
    for sort_dim in range(d):
        grid = [x for x in sel if x != sort_dim]
        order = grid + [sort_dim]
        cols = _descend(order, n, d, max_cells, cost_of)
        c = cost_of(order, cols)
        per_sort[sort_dim] = c
        if best is None or c < best[0]:
            best = (c, Layout(order=order, cols=cols, flatten=flatten))
    return OptimizationResult(
        layout=best[1],
        cost=best[0],
        learn_time=time.perf_counter() - t0,
        per_sort_dim_costs=per_sort,
    )


def _descend(order: list[int], n: int, d: int, max_cells: int, cost_of) -> list[int]:
    """Multiplicative coordinate descent over integer column counts."""
    if d == 1:
        return []
    c0 = max(1, int(round((max(n // 64, 1)) ** (1 / (d - 1)))))
    cols = [c0] * (d - 1)
    best_cost = cost_of(order, cols)
    for _ in range(12):  # descent rounds; converges much earlier in practice
        improved = False
        for i in range(d - 1):
            for mult in (2.0, 1.25, 0.8, 0.5):
                cand = list(cols)
                cand[i] = max(1, int(round(cols[i] * mult)))
                if cand[i] == cols[i]:
                    continue
                if int(np.prod(cand, dtype=np.int64)) > max_cells:
                    continue
                cc = cost_of(order, cand)
                if cc < best_cost - 1e-12:
                    cols, best_cost = cand, cc
                    improved = True
        if not improved:
            break
    return cols
