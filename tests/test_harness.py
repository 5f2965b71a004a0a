"""Table harnesses at test scale: structure, metrics sanity, N/A mirroring."""
import numpy as np
import pytest

from repro import datasets
from repro.harness.bench import (ALL_INDEXES, build_baseline, build_flood,
                                 default_cost_model, run_workload)
from repro.harness.tables import (GRID_FILE_NA, RSTAR_NA, TABLE2_INDEXES,
                                  format_matrix, format_table2, format_table4,
                                  table1, table2, table4)
from repro.workloads import make_workload


@pytest.fixture(scope="module")
def cm():
    return default_cost_model(n_layouts=4, n=15_000)


def test_table1_structure():
    res = table1(scale="test", n_queries=20)
    assert set(res) == {"sales", "tpch", "osm", "perfmon"}
    for name, row in res.items():
        assert row["records"] == datasets.TEST_ROWS[name]
        assert row["dimensions"] == len(datasets.DIMS[name])
        assert 0 < row["avg_selectivity"] < 0.2
        assert row["paper"]["dimensions"] == row["dimensions"]


def test_table2_structure_and_na(cm):
    res = table2(scale="test", names=("sales", "osm"), n_train=12, n_test=12,
                 cost_model=cm, tune=False)
    assert set(res) == {"sales", "osm"}
    assert res["osm"]["grid_file"] is None          # paper's N/A mirrored
    assert res["sales"]["grid_file"] is not None
    assert "rstar" not in res["sales"]              # omitted as in the paper
    for m in res["sales"].values():
        if m is None:
            continue
        assert m.so >= 1.0
        assert m.tt_ms >= m.st_ms
        assert np.isfinite(m.tps_ns)
    txt = format_table2(res)
    assert "N/A" in txt and "flood" in txt


def test_flood_competitive_at_test_scale(cm):
    """Flood must at least beat full scan on scan overhead on every dataset."""
    for name in ("sales", "tpch"):
        data, _ = datasets.load(name, n=datasets.TEST_ROWS[name])
        train = make_workload(data, name, 20, seed=1)
        test = make_workload(data, name, 20, seed=2)
        flood, _, _ = build_flood(data, train, cm)
        fs = build_baseline("full_scan", data, train)
        mf, ms = run_workload(flood, test), run_workload(fs, test)
        assert mf.so < ms.so, name


def test_table4_structure(cm):
    res = table4(scale="test", names=("sales", "perfmon"), n_train=12,
                 cost_model=cm)
    row = res["sales"]
    assert row["flood_total"] == pytest.approx(
        row["flood_learning"] + row["flood_loading"]
    )
    assert all(v is None or v > 0 for v in row.values())
    assert res["perfmon"]["grid_file"] is None
    assert res["perfmon"]["rstar"] is None          # paper: OOM → N/A
    assert res["sales"]["rstar"] is not None
    assert "flood_learning" in format_table4(res)


def test_format_matrix():
    m = {"a": {"a": 1.0, "b": 2.0}, "b": {"a": 3.0, "b": None}}
    txt = format_matrix(m)
    assert "N/A" in txt and "a" in txt


def test_na_sets_match_paper():
    assert GRID_FILE_NA == {"osm", "perfmon"}
    assert RSTAR_NA == {"tpch", "perfmon"}
    assert "rstar" in ALL_INDEXES and "rstar" not in TABLE2_INDEXES
