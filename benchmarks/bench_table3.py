"""Benchmark: Table 3 — cost-model transfer matrix (2x2 at test scale)."""
import pytest

from repro.harness.tables import table3


@pytest.mark.benchmark(group="table3")
def test_bench_table3(benchmark):
    res = benchmark.pedantic(
        lambda: table3(scale="test", names=("sales", "osm"), n_train=15,
                       n_test=15, n_layouts=3),
        rounds=1, iterations=1,
    )
    assert set(res) == {"sales", "osm"}
    for r in res.values():
        assert all(v > 0 for v in r.values())
