"""Benchmark: Table 2 — per-index query performance per dataset.

One benchmark per (dataset, index) pair measures the average query time
of the test workload on a built index (the TT column); a final benchmark
regenerates a full Table 2 at test scale. Builds are session-cached so
the timed region is the queries, like the paper's measurement.
"""
import numpy as np
import pytest

from repro import datasets
from repro.harness.bench import build_baseline, build_flood, default_cost_model, run_workload
from repro.harness.tables import GRID_FILE_NA, TABLE2_INDEXES, table2
from repro.workloads import make_workload

NAMES = ("sales", "tpch", "osm", "perfmon")


@pytest.fixture(scope="module")
def cm():
    return default_cost_model(n_layouts=4, n=15_000)


@pytest.fixture(scope="module")
def built(cm):
    out = {}
    for name in NAMES:
        data, _ = datasets.load(name, n=datasets.TEST_ROWS[name])
        train = make_workload(data, name, 20, seed=1)
        test = make_workload(data, name, 20, seed=2)
        idxs = {}
        for idx_name in TABLE2_INDEXES:
            if idx_name == "grid_file" and name in GRID_FILE_NA:
                continue
            if idx_name == "flood":
                idxs[idx_name], _, _ = build_flood(data, train, cm)
            else:
                idxs[idx_name] = build_baseline(idx_name, data, train, tune=False)
        out[name] = (idxs, test)
    return out


@pytest.mark.parametrize("name", NAMES)
@pytest.mark.parametrize("idx_name", TABLE2_INDEXES)
def test_bench_query_time(benchmark, built, name, idx_name):
    idxs, test = built[name]
    if idx_name not in idxs:
        pytest.skip(f"{idx_name} is N/A on {name} (as in the paper)")
    benchmark.group = f"table2-{name}"
    benchmark.name = idx_name
    m = benchmark.pedantic(lambda: run_workload(idxs[idx_name], test),
                           rounds=1, iterations=1)
    assert m.so >= 1.0
    benchmark.extra_info["scan_overhead"] = round(m.so, 2)
    benchmark.extra_info["tt_ms"] = round(m.tt_ms, 4)


@pytest.mark.benchmark(group="table2")
def test_bench_table2_full(benchmark, cm):
    res = benchmark.pedantic(
        lambda: table2(scale="test", names=("sales",), n_train=10, n_test=10,
                       cost_model=cm, tune=False),
        rounds=1, iterations=1,
    )
    assert res["sales"]["flood"] is not None
