"""Unit tests for Hamming distances and the inverted center index (§5.1)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.distance import (
    CenterIndex,
    asymmetric_hamming,
    hamming,
)

supports = st.lists(st.integers(0, 40), max_size=20).map(lambda l: sorted(set(l)))


class TestHamming:
    def test_identical(self):
        assert hamming([1, 2, 3], [1, 2, 3]) == 0

    def test_disjoint(self):
        assert hamming([1, 2], [3, 4]) == 4

    def test_partial(self):
        assert hamming([1, 2, 3], [2, 3, 4]) == 2

    def test_empty(self):
        assert hamming([], [1, 2]) == 2
        assert hamming([], []) == 0

    @given(supports, supports)
    @settings(max_examples=50, deadline=None)
    def test_symmetry(self, a, b):
        assert hamming(a, b) == hamming(b, a)

    @given(supports, supports, supports)
    @settings(max_examples=50, deadline=None)
    def test_triangle_inequality(self, a, b, c):
        assert hamming(a, c) <= hamming(a, b) + hamming(b, c)


class TestAsymmetricHamming:
    def test_alpha_one_is_plain_hamming(self):
        a, b = [1, 2, 5], [2, 3]
        assert asymmetric_hamming(a, b, alpha=1.0) == hamming(a, b)

    def test_paper_example(self):
        """§5.1 worked example: with alpha=0.1, u=(1,0,0,0,0) is closer to
        c1=(1,1,1,1,0) (0.3) than to c2=(0,0,0,0,1) (1.1)."""
        c1, c2, u = [0, 1, 2, 3], [4], [0]
        assert asymmetric_hamming(c1, u, alpha=0.1) == pytest.approx(0.3)
        assert asymmetric_hamming(c2, u, alpha=0.1) == pytest.approx(1.1)
        # vanilla Hamming prefers c2 — the pathology the paper fixes
        assert hamming(c2, u) < hamming(c1, u)

    def test_point_extra_costs_full(self):
        # point has 1s the center lacks -> cost 1 each
        assert asymmetric_hamming([], [1, 2, 3], alpha=0.1) == 3

    def test_center_extra_costs_alpha(self):
        assert asymmetric_hamming([1, 2, 3], [], alpha=0.1) == pytest.approx(0.3)

    @given(supports, supports)
    @settings(max_examples=50, deadline=None)
    def test_decomposition_identity(self, c, p):
        """d = |S_p| + alpha*|S_c| - (1+alpha)*overlap — the identity the
        vectorized CenterIndex uses."""
        alpha = 0.1
        ov = len(set(c) & set(p))
        expect = len(p) + alpha * len(c) - (1 + alpha) * ov
        assert asymmetric_hamming(c, p, alpha) == pytest.approx(expect)


class TestCenterIndex:
    def test_empty_raises(self):
        with pytest.raises(ValueError):
            CenterIndex().nearest([1])

    def test_single_center(self):
        ix = CenterIndex(alpha=0.1)
        i = ix.add([1, 2, 3])
        ci, d = ix.nearest([1, 2, 3])
        assert ci == i
        assert d == pytest.approx(0.0)

    def test_matches_bruteforce(self):
        rng = np.random.default_rng(0)
        ix = CenterIndex(alpha=0.1)
        centers = [sorted(set(rng.integers(0, 60, rng.integers(1, 15)).tolist())) for _ in range(20)]
        for c in centers:
            ix.add(c)
        for _ in range(30):
            p = sorted(set(rng.integers(0, 60, rng.integers(0, 15)).tolist()))
            ci, d = ix.nearest(p)
            brute = [asymmetric_hamming(c, p, 0.1) for c in centers]
            assert d == pytest.approx(min(brute))
            assert brute[ci] == pytest.approx(min(brute))

    def test_remove_excludes_center(self):
        ix = CenterIndex(alpha=0.1)
        i0 = ix.add([1, 2])
        i1 = ix.add([8, 9])
        ix.remove(i0)
        ci, _ = ix.nearest([1, 2])
        assert ci == i1
        assert len(ix) == 1

    def test_zero_overlap_prefers_smallest_center(self):
        ix = CenterIndex(alpha=0.1)
        ix.add(list(range(10)))
        small = ix.add([20])
        ci, d = ix.nearest([30])
        assert ci == small
        assert d == pytest.approx(1 + 0.1 * 1)

    def test_distance_never_negative(self):
        ix = CenterIndex(alpha=0.1)
        ix.add([1, 2, 3])
        _, d = ix.nearest([1, 2, 3])
        assert d >= 0.0

    def test_alpha_one_matches_plain_hamming(self):
        ix = CenterIndex(alpha=1.0)
        centers = [[1, 2, 3], [4, 5], [1, 9]]
        for c in centers:
            ix.add(c)
        p = [1, 4, 9]
        ci, d = ix.nearest(p)
        brute = [hamming(c, p) for c in centers]
        assert d == pytest.approx(min(brute))
        assert brute[ci] == min(brute)

    def test_alive_indices(self):
        ix = CenterIndex()
        a = ix.add([1])
        b = ix.add([2])
        ix.remove(a)
        assert ix.alive_indices() == [b]
