"""PLM: lower-bound property, δ mean-error bound, exact lookups."""
import numpy as np
import pytest

from repro.core.plm import PLM


@pytest.fixture(params=["uniform", "skewed", "staggered", "dupes"])
def values(request):
    rng = np.random.default_rng(11)
    if request.param == "uniform":
        v = rng.random(4000) * 1000
    elif request.param == "skewed":
        v = rng.lognormal(0, 2.5, 4000)
    elif request.param == "staggered":
        # the paper's synthetic: uniform over identically sized disjoint intervals
        v = np.concatenate([rng.random(800) + 10 * k for k in range(5)])
    else:
        v = rng.integers(0, 40, 4000).astype(float)
    return np.sort(v)


@pytest.mark.parametrize("delta", [1.0, 50.0, 500.0])
def test_predictions_lower_bound_true_index(values, delta):
    m = PLM(values, delta=delta)
    uniq = np.unique(values)
    first = np.searchsorted(values, uniq, side="left")
    pred = np.array([m.predict(v) for v in uniq])
    assert (pred <= first).all()


@pytest.mark.parametrize("delta", [1.0, 50.0, 500.0])
def test_mean_error_within_delta(values, delta):
    m = PLM(values, delta=delta)
    uniq = np.unique(values)
    first = np.searchsorted(values, uniq, side="left")
    pred = np.array([m.predict(v) for v in uniq])
    # per-slice mean error <= delta implies global mean <= delta; predict()
    # floors the real-valued segment output to an index, adding < 1.
    assert (first - pred).mean() <= delta + 1.0


def test_smaller_delta_means_more_segments(values):
    assert PLM(values, delta=2.0).n_segments >= PLM(values, delta=200.0).n_segments


@pytest.mark.parametrize("delta", [5.0, 50.0])
def test_lookups_exact(values, delta):
    m = PLM(values, delta=delta)
    rng = np.random.default_rng(5)
    probes = np.concatenate(
        [rng.choice(values, 50), rng.random(50) * values.max() * 1.1,
         [values[0] - 1, values[-1] + 1]]
    )
    for v in probes:
        assert m.lookup_left(float(v)) == np.searchsorted(values, v, side="left")
        assert m.lookup_right(float(v)) == np.searchsorted(values, v, side="right")


def test_single_value():
    m = PLM(np.array([3.0]))
    assert m.lookup_left(3.0) == 0
    assert m.lookup_right(3.0) == 1
    assert m.lookup_left(4.0) == 1


def test_constant_values():
    m = PLM(np.full(50, 2.0), delta=10)
    assert m.lookup_left(2.0) == 0
    assert m.lookup_right(2.0) == 50
    assert m.n_segments == 1


def test_size_bytes_positive(values):
    assert PLM(values).size_bytes() > 0


def test_empty_rejected():
    with pytest.raises(ValueError):
        PLM(np.array([]))
