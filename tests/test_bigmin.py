"""Z-order encode/decode and BIGMIN, validated exhaustively vs brute force."""
import itertools

import numpy as np
import pytest

from repro.core.bigmin import bigmin, in_rect, interleave, quantize, zrange_of_query


def brute_zvals(d, bits):
    coords = np.array(list(itertools.product(range(2**bits), repeat=d)))
    return coords, interleave(coords, bits)


def test_interleave_2d_known_values():
    # classic Morton order for 2-bit 2D: (x,y) -> z with dim0 as MSB of each pair
    coords = np.array([[0, 0], [0, 1], [1, 0], [1, 1]])
    z = interleave(coords, 1)
    assert list(z) == [0, 1, 2, 3]


def test_interleave_is_bijective():
    coords, z = brute_zvals(3, 3)
    assert len(set(z.tolist())) == len(z)


def test_quantize_bounds():
    data = np.array([[0.0, -5.0], [10.0, 5.0], [5.0, 0.0]])
    mins, maxs = data.min(0), data.max(0)
    q = quantize(data, mins, maxs, 4)
    assert q.min() == 0 and q.max() == 15


def test_quantize_degenerate_dim():
    data = np.full((5, 2), 3.0)
    q = quantize(data, data.min(0), data.max(0), 4)
    assert (q == 0).all()


@pytest.mark.parametrize("d,bits", [(2, 3), (2, 4), (3, 2), (4, 2)])
def test_bigmin_matches_brute_force(d, bits):
    coords, z = brute_zvals(d, bits)
    order = np.argsort(z)
    z_sorted = z[order]
    rng = np.random.default_rng(d * 100 + bits)
    for _ in range(40):
        lo = rng.integers(0, 2**bits, d)
        hi = np.minimum(lo + rng.integers(0, 2**bits, d), 2**bits - 1)
        zmin, zmax = zrange_of_query(lo, hi, bits)
        in_mask = np.array([in_rect(int(v), zmin, zmax, d, bits) for v in z_sorted])
        for zc in rng.integers(0, 2 ** (d * bits), 15):
            zc = int(zc)
            cand = z_sorted[(z_sorted >= zc) & in_mask]
            expect = int(cand[0]) if cand.size else None
            if zc > zmax:
                continue  # callers never ask beyond zmax
            got = bigmin(zc, zmin, zmax, d, bits)
            if expect is None:
                assert got in (-1, zc) or not in_rect(got, zmin, zmax, d, bits)
            else:
                assert got == expect, (zc, zmin, zmax, d, bits)


def test_in_rect_corners():
    lo = np.array([1, 2])
    hi = np.array([5, 6])
    zmin, zmax = zrange_of_query(lo, hi, 3)
    assert in_rect(zmin, zmin, zmax, 2, 3)
    assert in_rect(zmax, zmin, zmax, 2, 3)


def test_bigmin_inside_returns_self():
    lo = np.array([0, 0])
    hi = np.array([7, 7])
    zmin, zmax = zrange_of_query(lo, hi, 3)
    assert bigmin(13, zmin, zmax, 2, 3) == 13
