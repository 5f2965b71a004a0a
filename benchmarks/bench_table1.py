"""Benchmark: Table 1 regeneration (dataset + workload characteristics)."""
import pytest

from repro.harness.tables import table1


@pytest.mark.benchmark(group="table1")
def test_bench_table1(benchmark):
    res = benchmark.pedantic(
        lambda: table1(scale="test", n_queries=20), rounds=1, iterations=1
    )
    assert set(res) == {"sales", "tpch", "osm", "perfmon"}
