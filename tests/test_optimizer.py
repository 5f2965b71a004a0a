"""Layout optimizer: valid layouts, workload adaptation, cost descent."""
import numpy as np
import pytest

from repro.core.cost_model import CostModel
from repro.core.optimizer import _estimate_stats, _flat_bounds, optimize_layout
from repro.core.query import query_from_dict
from repro.indexes.flood import FloodIndex


def _data(n=5000, d=4, seed=0):
    return np.random.default_rng(seed).random((n, d)) * 100


def _range_wl(data, dims_sel, n_q=40, seed=1):
    """Workload filtering the given dims with the given selectivities."""
    rng = np.random.default_rng(seed)
    d = data.shape[1]
    out = []
    for _ in range(n_q):
        bounds = {}
        for dim, sel in dims_sel.items():
            width = sel * (data[:, dim].max() - data[:, dim].min())
            lo = rng.uniform(data[:, dim].min(), data[:, dim].max() - width)
            bounds[dim] = (float(lo), float(lo + width))
        out.append(query_from_dict(d, bounds))
    return out


@pytest.fixture(scope="module")
def cm():
    data = _data(seed=7)
    wl = _range_wl(data, {0: 0.1, 1: 0.2, 2: 0.3}, n_q=25, seed=3)
    return CostModel().calibrate(data, wl, n_layouts=5, seed=0)


def test_layout_is_valid_permutation(cm):
    data = _data()
    wl = _range_wl(data, {0: 0.05, 1: 0.2})
    res = optimize_layout(data, wl, cm)
    assert sorted(res.layout.order) == [0, 1, 2, 3]
    assert len(res.layout.cols) == 3
    assert res.cost > 0 and res.learn_time > 0
    assert set(res.per_sort_dim_costs) == {0, 1, 2, 3}


def test_optimized_beats_bad_layout(cm):
    """The learned layout must outperform a deliberately bad one."""
    data = _data(n=20000)
    wl = _range_wl(data, {0: 0.02, 1: 0.05}, n_q=30)
    res = optimize_layout(data, wl, cm, seed=2)
    good = FloodIndex(layout=res.layout).build(data)
    from repro.indexes.flood import Layout

    bad = FloodIndex(layout=Layout(order=[0, 1, 2, 3], cols=[1, 1, 1])).build(data)
    g = np.mean([good.query(q).n_scanned for q in wl])
    b = np.mean([bad.query(q).n_scanned for q in wl])
    assert g < b / 2


def test_unfiltered_dims_get_few_columns(cm):
    """Dims never filtered should not burn cells (paper §7.5: Flood learns
    which dimensions to prioritize)."""
    data = _data(n=10000)
    wl = _range_wl(data, {0: 0.05, 1: 0.05}, n_q=30)
    res = optimize_layout(data, wl, cm, seed=1)
    cols_of = dict(zip(res.layout.grid_dims, res.layout.cols))
    filtered_cols = [cols_of[dm] for dm in (0, 1) if dm in cols_of]
    unfiltered_cols = [cols_of[dm] for dm in (2, 3) if dm in cols_of]
    if filtered_cols and unfiltered_cols:
        assert max(unfiltered_cols) <= max(filtered_cols)


def test_sort_dim_tends_to_filtered_dim(cm):
    """With one dominant filtered dim, it should be sort dim (zero scan
    overhead) or carry most of the columns."""
    data = _data(n=10000, seed=5)
    wl = _range_wl(data, {2: 0.05}, n_q=30, seed=8)
    res = optimize_layout(data, wl, cm, seed=3)
    lay = res.layout
    if lay.sort_dim != 2:
        cols_of = dict(zip(lay.grid_dims, lay.cols))
        assert cols_of[2] == max(lay.cols)


def test_estimate_stats_consistency():
    """Estimated N_c/N_s track reality on a uniform dataset."""
    data = _data(n=8000, seed=11)
    wl = _range_wl(data, {0: 0.2, 1: 0.2}, n_q=10, seed=12)
    flat = _flat_bounds(data, wl)
    filtered = np.zeros((len(wl), 4), dtype=bool)
    for qi, q in enumerate(wl):
        filtered[qi, q.filtered_dims] = True
    from repro.indexes.flood import Layout

    lay = Layout(order=[0, 1, 2, 3], cols=[8, 8, 2])
    X = _estimate_stats(8000, flat, filtered, lay.order, lay.cols)
    from repro.core.cost_model import FEATURES

    nc_col, ns_col = FEATURES.index("n_cells"), FEATURES.index("n_scanned")
    idx = FloodIndex(layout=lay).build(data)
    for qi, q in enumerate(wl):
        r = idx.query(q)
        assert X[qi, nc_col] == r.n_cells
        assert 0.3 < X[qi, ns_col] / max(1, r.n_scanned) < 3.0


def test_sampling_caps_respected(cm):
    data = _data(n=30000)
    wl = _range_wl(data, {0: 0.1}, n_q=300)
    res = optimize_layout(data, wl, cm, sample_records=2000, sample_queries=20)
    assert res.layout.n_cells >= 1


def test_empty_workload_raises(cm):
    with pytest.raises(ValueError):
        optimize_layout(_data(), [], cm)
