"""Measurement harness shared by the table reproductions (§7).

Runs a workload through an index and aggregates exactly Table 2's
columns: scan overhead SO (total points scanned / total result size),
time-per-scanned-point TPS (ns), scan time ST (ms/query), index time IT
(ms/query), total time TT (ms/query). Also tunes baseline page sizes on
the train workload ("we tuned the baseline approaches as much as
possible per workload", §7.4) and builds Flood via the learned layout.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.core.cost_model import CostModel
from repro.core.optimizer import optimize_layout
from repro.core.query import Query
from repro.indexes.base import BaseIndex
from repro.indexes.clustered import ClusteredIndex
from repro.indexes.flood import FloodIndex
from repro.indexes.full_scan import FullScan
from repro.indexes.grid_file import GridFile
from repro.indexes.hyperoctree import Hyperoctree
from repro.indexes.kdtree import KDTree
from repro.indexes.rstar import RStarTree
from repro.indexes.ubtree import UBTree
from repro.indexes.zorder import ZOrderIndex

#: Table 2 row order (paper order); flood last as in the paper's table.
BASELINES = (
    "full_scan", "clustered", "zorder", "ubtree",
    "hyperoctree", "kdtree", "grid_file", "rstar",
)
ALL_INDEXES = BASELINES + ("flood",)

#: page-size grid for baseline tuning (paper: "tuned the page sizes").
#: Fig 8's point is that page size barely moves the needle; two candidates
#: keep tuning honest without dominating harness runtime.
PAGE_SIZES = (1024, 4096)

_PAGED = {
    "zorder": ZOrderIndex,
    "ubtree": UBTree,
    "hyperoctree": Hyperoctree,
    "kdtree": KDTree,
    "grid_file": GridFile,
    "rstar": RStarTree,
}


@dataclass
class Metrics:
    """One Table 2 cell group: SO, TPS(ns), ST(ms), IT(ms), TT(ms)."""

    so: float
    tps_ns: float
    st_ms: float
    it_ms: float
    tt_ms: float
    n_queries: int
    index_size: int
    build_time: float

    def row(self) -> dict:
        return {
            "SO": round(self.so, 2),
            "TPS": round(self.tps_ns, 2),
            "ST": round(self.st_ms, 4),
            "IT": round(self.it_ms, 4),
            "TT": round(self.tt_ms, 4),
        }


def run_workload(index: BaseIndex, workload: list[Query]) -> Metrics:
    """Aggregate a workload's query results into Table 2 metrics."""
    scanned = matched = 0
    st = it = tt = 0.0
    for q in workload:
        r = index.query(q)
        scanned += r.n_scanned
        matched += r.n_matched
        st += r.scan_time
        it += r.index_time
        tt += r.total_time
    nq = max(1, len(workload))
    return Metrics(
        so=scanned / max(1, matched),
        tps_ns=st / max(1, scanned) * 1e9,
        st_ms=st / nq * 1e3,
        it_ms=it / nq * 1e3,
        tt_ms=tt / nq * 1e3,
        n_queries=len(workload),
        index_size=index.index_size_bytes(),
        build_time=index.build_time,
    )


def build_baseline(name: str, data: np.ndarray, train: list[Query],
                   tune: bool = True, tune_queries: int = 10) -> BaseIndex:
    """Build one baseline, tuning its page size on the train workload."""
    if name == "full_scan":
        return FullScan().build(data, train)
    if name == "clustered":
        return ClusteredIndex().build(data, train)
    cls = _PAGED[name]
    if not tune:
        return cls().build(data, train)
    sub = train[:tune_queries]
    best = None
    for ps in PAGE_SIZES:
        idx = cls(page_size=ps).build(data, train)
        m = run_workload(idx, sub)
        if best is None or m.tt_ms < best[0]:
            best = (m.tt_ms, idx)
    return best[1]


def build_flood(data: np.ndarray, train: list[Query], cost_model: CostModel,
                seed: int = 0, **opt_kw) -> tuple[FloodIndex, float, float]:
    """Learn the layout (§4.2) then load the index; returns
    (index, learning time, loading time) — Table 4's Flood split."""
    res = optimize_layout(data, train, cost_model, seed=seed, **opt_kw)
    t0 = time.perf_counter()
    idx = FloodIndex(layout=res.layout).build(data, train)
    load_time = time.perf_counter() - t0
    idx.learn_time = res.learn_time
    idx.opt_result = res
    return idx, res.learn_time, load_time


def calibration_dataset(n: int = 40_000, d: int = 4, seed: int = 123) -> np.ndarray:
    """Arbitrary synthetic data for one-time cost-model calibration
    (§4.1.1: "Flood uses an arbitrary dataset and query workload, which
    can be synthetic")."""
    g = np.random.default_rng(seed)
    cols = [g.random(n), g.lognormal(0, 1, n), g.integers(0, 1000, n).astype(float),
            g.normal(0, 1, n)]
    return np.column_stack(cols[:d] if d <= 4 else cols + [g.random(n) for _ in range(d - 4)])


def default_cost_model(seed: int = 0, n_layouts: int = 8,
                       n: int = 40_000) -> CostModel:
    """Calibrate the machine-level cost model once on synthetic data."""
    from repro.workloads import random_workload

    data = calibration_dataset(n=n)
    wl = random_workload(data, 40, n_types=8, max_dims=4,
                         target_selectivity=5e-3, seed=seed)
    return CostModel().calibrate(data, wl, n_layouts=n_layouts, seed=seed)
