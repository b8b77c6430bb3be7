"""Unit tests for the Hungarian algorithm."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.video.hungarian import hungarian


def cost_of(pairs, m):
    return sum(m[r, c] for r, c in pairs)


def test_identity():
    m = np.array([[1.0, 10.0], [10.0, 1.0]])
    assert hungarian(m) == [(0, 0), (1, 1)]


def test_anti_identity():
    m = np.array([[10.0, 1.0], [1.0, 10.0]])
    assert hungarian(m) == [(0, 1), (1, 0)]


def test_classic_3x3():
    m = np.array([[4, 1, 3], [2, 0, 5], [3, 2, 2]], dtype=float)
    pairs = hungarian(m)
    assert cost_of(pairs, m) == 5.0  # 1 + 2 + 2


def test_rectangular_more_cols():
    m = np.array([[5.0, 1.0, 9.0], [9.0, 5.0, 1.0]])
    pairs = hungarian(m)
    assert pairs == [(0, 1), (1, 2)]


def test_rectangular_more_rows():
    m = np.array([[5.0, 9.0], [1.0, 9.0], [9.0, 1.0]])
    pairs = hungarian(m)
    assert len(pairs) == 2
    assert cost_of(pairs, m) == 2.0


def test_empty_dimensions():
    assert hungarian(np.zeros((0, 3))) == []
    assert hungarian(np.zeros((3, 0))) == []


def test_single_cell():
    assert hungarian(np.array([[42.0]])) == [(0, 0)]


def test_rejects_bad_ndim():
    with pytest.raises(ValueError):
        hungarian(np.zeros(3))


def _brute_force(m):
    from itertools import permutations

    n, cols = m.shape
    assert n <= cols
    best = None
    for perm in permutations(range(cols), n):
        c = sum(m[i, j] for i, j in enumerate(perm))
        best = c if best is None or c < best else best
    return best


@settings(max_examples=60, deadline=None)
@given(
    st.integers(1, 5),
    st.integers(1, 5),
    st.integers(0, 10_000),
)
def test_matches_brute_force(n, m, seed):
    rng = np.random.default_rng(seed)
    mat = rng.uniform(0, 100, size=(n, m))
    pairs = hungarian(mat)
    assert len(pairs) == min(n, m)
    rows = [r for r, _ in pairs]
    cols = [c for _, c in pairs]
    assert len(set(rows)) == len(rows) and len(set(cols)) == len(cols)
    small = mat if n <= m else mat.T
    assert cost_of(pairs, mat) == pytest.approx(_brute_force(small))
