"""Unit tests for repro.core.minhash — estimator accuracy and edge cases."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import minhash


def _sets(overlap: int, only_a: int, only_b: int):
    shared = [f"s{i}" for i in range(overlap)]
    a = shared + [f"a{i}" for i in range(only_a)]
    b = shared + [f"b{i}" for i in range(only_b)]
    return a, b


class TestSignature:
    def test_deterministic(self):
        s1 = minhash.minhash_signature(["x", "y", "z"])
        s2 = minhash.minhash_signature(["x", "y", "z"])
        assert np.array_equal(s1, s2)

    def test_set_semantics_duplicates_ignored(self):
        s1 = minhash.minhash_signature(["x", "y"])
        s2 = minhash.minhash_signature(["x", "x", "y", "y", "y"])
        assert np.array_equal(s1, s2)

    def test_order_invariant(self):
        s1 = minhash.minhash_signature(["x", "y", "z"])
        s2 = minhash.minhash_signature(["z", "x", "y"])
        assert np.array_equal(s1, s2)

    def test_empty_set_sentinel(self):
        sig = minhash.minhash_signature([])
        assert minhash.is_empty(sig)
        assert sig.shape == (minhash.DEFAULT_NUM_PERM,)

    def test_nonempty_not_sentinel(self):
        assert not minhash.is_empty(minhash.minhash_signature(["x"]))

    def test_num_perm_respected(self):
        assert minhash.minhash_signature(["x"], num_perm=16).shape == (16,)

    @pytest.mark.parametrize("family", ["murmur3", "xx", "splitmix"])
    def test_hash_families_all_work(self, family):
        a, b = _sets(50, 50, 50)  # true J = 1/3
        sa = minhash.minhash_signature(a, num_perm=256, family=family)
        sb = minhash.minhash_signature(b, num_perm=256, family=family)
        assert abs(minhash.jaccard_estimate(sa, sb) - 1 / 3) < 0.12


class TestJaccard:
    def test_identical_sets(self):
        s = minhash.minhash_signature([f"v{i}" for i in range(100)])
        assert minhash.jaccard_estimate(s, s) == 1.0

    def test_disjoint_sets(self):
        sa = minhash.minhash_signature([f"a{i}" for i in range(100)], num_perm=128)
        sb = minhash.minhash_signature([f"b{i}" for i in range(100)], num_perm=128)
        assert minhash.jaccard_estimate(sa, sb) < 0.05

    @pytest.mark.parametrize("true_j,overlap,extra", [(0.5, 100, 50), (0.2, 50, 100), (0.8, 400, 50)])
    def test_estimator_accuracy(self, true_j, overlap, extra):
        a, b = _sets(overlap, extra, extra)
        exact = overlap / (overlap + 2 * extra)
        assert abs(exact - true_j) < 1e-9
        sa = minhash.minhash_signature(a, num_perm=256)
        sb = minhash.minhash_signature(b, num_perm=256)
        assert abs(minhash.jaccard_estimate(sa, sb) - true_j) < 0.1

    def test_empty_vs_anything_zero(self):
        s = minhash.minhash_signature(["x"])
        e = minhash.minhash_signature([])
        assert minhash.jaccard_estimate(s, e) == 0.0
        assert minhash.jaccard_estimate(e, e) == 0.0

    @given(st.integers(1, 50), st.integers(0, 50))
    @settings(max_examples=20, deadline=None)
    def test_bounds(self, n1, n2):
        sa = minhash.minhash_signature([f"a{i}" for i in range(n1)], num_perm=32)
        sb = minhash.minhash_signature([f"a{i}" for i in range(n2)], num_perm=32)
        assert 0.0 <= minhash.jaccard_estimate(sa, sb) <= 1.0


class TestContainment:
    def test_full_containment(self):
        a = [f"v{i}" for i in range(100)]
        b = a + [f"w{i}" for i in range(300)]
        sa = minhash.minhash_signature(a, num_perm=256)
        sb = minhash.minhash_signature(b, num_perm=256)
        c = minhash.containment_estimate(sa, sb, len(set(a)), len(set(b)))
        assert c > 0.8

    def test_no_containment(self):
        sa = minhash.minhash_signature([f"a{i}" for i in range(100)], num_perm=128)
        sb = minhash.minhash_signature([f"b{i}" for i in range(100)], num_perm=128)
        assert minhash.containment_estimate(sa, sb, 100, 100) < 0.1

    def test_half_containment(self):
        a, b = _sets(50, 50, 200)  # |A∩B|/|A| = 0.5
        sa = minhash.minhash_signature(a, num_perm=256)
        sb = minhash.minhash_signature(b, num_perm=256)
        c = minhash.containment_estimate(sa, sb, 100, 250)
        assert abs(c - 0.5) < 0.2

    def test_zero_size_a(self):
        s = minhash.minhash_signature(["x"])
        assert minhash.containment_estimate(s, s, 0, 1) == 0.0


class TestMerge:
    def test_merge_equals_union_signature(self):
        a = [f"a{i}" for i in range(50)]
        b = [f"b{i}" for i in range(50)]
        sa, sb = minhash.minhash_signature(a), minhash.minhash_signature(b)
        su = minhash.minhash_signature(a + b)
        assert np.array_equal(minhash.merge_signatures(sa, sb), su)

    def test_merge_with_empty(self):
        sa = minhash.minhash_signature(["x"])
        e = minhash.minhash_signature([])
        assert np.array_equal(minhash.merge_signatures(sa, e), sa)
        assert np.array_equal(minhash.merge_signatures(e, sa), sa)
