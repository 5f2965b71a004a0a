"""Benchmark: Table 4 — index creation times (build each index once)."""
import pytest

from repro import datasets
from repro.harness.bench import build_baseline, build_flood, default_cost_model
from repro.harness.tables import table4
from repro.workloads import make_workload

BUILDS = ("clustered", "zorder", "ubtree", "hyperoctree", "kdtree", "rstar",
          "grid_file")


@pytest.fixture(scope="module")
def tpch_small():
    data, _ = datasets.load("tpch", n=datasets.TEST_ROWS["tpch"])
    return data, make_workload(data, "tpch", 15, seed=1)


@pytest.mark.parametrize("idx_name", BUILDS)
def test_bench_build(benchmark, tpch_small, idx_name):
    data, train = tpch_small
    benchmark.group = "table4-build-tpch"
    benchmark.name = idx_name
    benchmark.pedantic(
        lambda: build_baseline(idx_name, data, train, tune=False),
        rounds=1, iterations=1,
    )


def test_bench_flood_learn_and_load(benchmark, tpch_small):
    data, train = tpch_small
    cm = default_cost_model(n_layouts=3, n=10_000)
    benchmark.group = "table4-build-tpch"
    benchmark.name = "flood(learn+load)"
    idx, learn, load = benchmark.pedantic(
        lambda: build_flood(data, train, cm), rounds=1, iterations=1
    )
    benchmark.extra_info["learning_s"] = round(learn, 3)
    benchmark.extra_info["loading_s"] = round(load, 3)


@pytest.mark.benchmark(group="table4")
def test_bench_table4_full(benchmark):
    cm = default_cost_model(n_layouts=3, n=10_000)
    res = benchmark.pedantic(
        lambda: table4(scale="test", names=("sales",), n_train=10,
                       cost_model=cm),
        rounds=1, iterations=1,
    )
    assert res["sales"]["flood_total"] > 0
