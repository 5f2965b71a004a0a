"""Ablation invariants from the paper's analysis sections.

Fig 11's decomposition (sort dim, flattening, learning) is a figure and
out of scope, but its *claims* are cheap invariants we can assert:
flattening helps on skewed data, learning beats the unlearned default,
refinement beats no sort dimension, and the UB-tree's skip-ahead scans
no more than the plain Z-order index.
"""
import numpy as np
import pytest

from repro.core.query import query_from_dict
from repro.harness.bench import default_cost_model, run_workload
from repro.indexes.flood import FloodIndex, Layout
from repro.indexes.ubtree import UBTree
from repro.indexes.zorder import ZOrderIndex
from repro.workloads import make_workload
from repro import datasets


@pytest.fixture(scope="module")
def osm_small():
    data, _ = datasets.load("osm", n=20_000)
    train = make_workload(data, "osm", 25, seed=1)
    test = make_workload(data, "osm", 25, seed=2)
    return data, train, test


def test_flattening_reduces_scan_overhead_on_skew(osm_small):
    """§5.1: flattening provides large gains on skewed datasets."""
    data, train, test = osm_small
    lay_f = Layout(order=[1, 2, 3, 0, 4, 5], cols=[6, 6, 6, 1, 1], flatten=True)
    lay_r = Layout(order=[1, 2, 3, 0, 4, 5], cols=[6, 6, 6, 1, 1], flatten=False)
    so_f = run_workload(FloodIndex(layout=lay_f).build(data), test).so
    so_r = run_workload(FloodIndex(layout=lay_r).build(data), test).so
    assert so_f < so_r


def test_learned_layout_beats_unlearned_default(osm_small):
    """§4/Fig 11: learning from queries gives major gains on all datasets."""
    from repro.harness.bench import build_flood

    data, train, test = osm_small
    cm = default_cost_model(n_layouts=4, n=15_000)
    learned, _, _ = build_flood(data, train, cm)
    from repro.indexes.flood import default_layout

    unlearned = FloodIndex(layout=default_layout(data, [])).build(data)
    m_l = run_workload(learned, test)
    m_u = run_workload(unlearned, test)
    # at unit-test scale wall-clock is noise-bound; scan overhead is the
    # scale-robust signal that the learned layout fits the workload
    assert m_l.so < m_u.so


def test_sort_dim_refinement_beats_histogram(osm_small):
    """Fig 11 (1): sorting the last dimension instead of gridding it."""
    data, _, _ = osm_small
    # same cell budget; one uses dim 1 as sort dim, the other grids it
    with_sort = Layout(order=[2, 3, 0, 4, 5, 1], cols=[8, 8, 1, 1, 1])
    histogram = Layout(order=[2, 3, 1, 0, 4, 5], cols=[8, 8, 4, 1, 1])
    q = query_from_dict(6, {1: (1.2e9, 1.25e9), 2: (41.0, 42.0), 3: (-73.0, -71.0)})
    so_s = FloodIndex(layout=with_sort).build(data).query(q).scan_overhead
    so_h = FloodIndex(layout=histogram).build(data).query(q).scan_overhead
    assert so_s <= so_h * 1.5  # sort dim never much worse, usually better


def test_ubtree_scans_no_more_than_zorder():
    """Appendix A: the UB-tree's BIGMIN skip-ahead avoids pages the plain
    Z-order index visits (page min/max pruning can't catch everything)."""
    rng = np.random.default_rng(3)
    data = rng.random((30_000, 3)) * 100
    wl = [
        query_from_dict(3, {0: tuple(np.sort(rng.choice(data[:, 0], 2))),
                            1: tuple(np.sort(rng.choice(data[:, 1], 2)))})
        for _ in range(10)
    ]
    z = ZOrderIndex(page_size=256).build(data)
    u = UBTree(page_size=256).build(data)
    sz = sum(z.query(q).n_scanned for q in wl)
    su = sum(u.query(q).n_scanned for q in wl)
    assert su <= sz * 1.05


def test_exact_ranges_counted(osm_small):
    """§7.1: with a filter only on the sort dim, refined ranges are exact."""
    data, _, _ = osm_small
    lay = Layout(order=[2, 3, 0, 4, 5, 1], cols=[4, 4, 1, 1, 1])
    idx = FloodIndex(layout=lay).build(data)
    q = query_from_dict(6, {1: (1.15e9, 1.3e9)})
    r = idx.query(q)
    assert r.n_exact == r.n_scanned == r.n_matched


def test_cumulative_aggregate_path(osm_small):
    """SUM over exact ranges goes through prefix sums and stays exact."""
    data, _, _ = osm_small
    lay = Layout(order=[2, 3, 0, 4, 5, 1], cols=[4, 4, 1, 1, 1])
    idx = FloodIndex(layout=lay).build(data)
    q = query_from_dict(6, {1: (1.15e9, 1.3e9)}, agg="sum", agg_dim=5)
    r = idx.query(q)
    m = q.mask(data)
    assert np.isclose(r.value, data[m, 5].sum())
    assert r.n_exact == r.n_scanned
