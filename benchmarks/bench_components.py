"""Micro-benchmarks for Flood's learned components.

Covers the §7.8 comparison (per-cell CDF model lookup: PLM vs binary
search) and the cost of flattening/calibration — the knobs a reader
would tune when porting Flood.
"""
import numpy as np
import pytest

from repro.core.plm import PLM
from repro.core.rmi import RMI
from repro.harness.bench import calibration_dataset, default_cost_model


@pytest.fixture(scope="module")
def sorted_vals():
    rng = np.random.default_rng(0)
    return np.sort(np.concatenate([rng.random(20_000) + 10 * k for k in range(5)]))


@pytest.mark.benchmark(group="percell-lookup")
def test_bench_plm_lookup(benchmark, sorted_vals):
    m = PLM(sorted_vals, delta=50)
    probes = np.random.default_rng(1).choice(sorted_vals, 200)

    def run():
        return [m.lookup_left(float(v)) for v in probes]

    got = benchmark(run)
    assert got == [int(np.searchsorted(sorted_vals, v, "left")) for v in probes]


@pytest.mark.benchmark(group="percell-lookup")
def test_bench_binary_search_lookup(benchmark, sorted_vals):
    probes = np.random.default_rng(1).choice(sorted_vals, 200)

    def run():
        return [int(np.searchsorted(sorted_vals, float(v), "left")) for v in probes]

    benchmark(run)


@pytest.mark.benchmark(group="flatten")
def test_bench_rmi_cdf(benchmark):
    rng = np.random.default_rng(2)
    m = RMI(rng.lognormal(0, 2, 100_000))
    probes = rng.lognormal(0, 2, 10_000)
    out = benchmark(lambda: m.cdf(probes))
    assert out.shape == (10_000,)


@pytest.mark.benchmark(group="calibration")
def test_bench_cost_model_calibration(benchmark):
    cm = benchmark.pedantic(
        lambda: default_cost_model(n_layouts=3, n=10_000),
        rounds=1, iterations=1,
    )
    assert cm.n_examples > 0


@pytest.mark.benchmark(group="calibration")
def test_bench_calibration_dataset(benchmark):
    data = benchmark(lambda: calibration_dataset(n=20_000))
    assert data.shape == (20_000, 4)
