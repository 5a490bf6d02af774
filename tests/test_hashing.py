"""Unit tests for repro.core.hashing — determinism, distribution, independence."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import hashing


class TestHashStrings:
    def test_deterministic(self):
        a = hashing.hash_strings(["alpha", "beta", "gamma"])
        b = hashing.hash_strings(["alpha", "beta", "gamma"])
        assert np.array_equal(a, b)

    def test_distinct_inputs_distinct_hashes(self):
        vals = [f"value-{i}" for i in range(1000)]
        h = hashing.hash_strings(vals)
        assert len(np.unique(h)) == 1000

    def test_empty_array(self):
        assert hashing.hash_strings([]).shape == (0,)

    def test_empty_string(self):
        h = hashing.hash_strings([""])
        assert h[0] == np.uint64(0xCBF29CE484222325)  # FNV offset basis

    def test_known_fnv1a_vector(self):
        # FNV-1a 64 of "a" is a published test vector.
        assert hashing.hash_strings(["a"])[0] == np.uint64(0xAF63DC4C8601EC8C)

    def test_unicode_handled(self):
        h = hashing.hash_strings(["Zambrów", "Bełchatów", "日本"])
        assert len(np.unique(h)) == 3

    def test_order_independent_per_element(self):
        h1 = hashing.hash_strings(["x", "y"])
        h2 = hashing.hash_strings(["y", "x"])
        assert h1[0] == h2[1] and h1[1] == h2[0]

    def test_dtype_uint64(self):
        assert hashing.hash_strings(["q"]).dtype == np.uint64

    def test_numbers_stringified(self):
        assert hashing.hash_strings([1])[0] == hashing.hash_strings(["1"])[0]

    @given(st.lists(st.text(max_size=30), min_size=1, max_size=20))
    @settings(max_examples=25, deadline=None)
    def test_property_repeatable(self, xs):
        assert np.array_equal(hashing.hash_strings(xs), hashing.hash_strings(xs))


class TestMixers:
    @pytest.mark.parametrize("name", sorted(hashing.MIXERS))
    def test_bijective_on_sample(self, name):
        x = np.arange(10000, dtype=np.uint64)
        y = hashing.MIXERS[name](x)
        assert len(np.unique(y)) == 10000

    @pytest.mark.parametrize("name", sorted(hashing.MIXERS))
    def test_avalanche_bit_balance(self, name):
        # Each output bit should be ~50% ones over sequential inputs.
        x = np.arange(20000, dtype=np.uint64)
        y = hashing.MIXERS[name](x)
        for bit in [0, 17, 31, 45, 63]:
            frac = np.mean((y >> np.uint64(bit)) & np.uint64(1))
            assert 0.45 < frac < 0.55, f"bit {bit} unbalanced: {frac}"

    def test_families_disagree(self):
        x = np.arange(100, dtype=np.uint64)
        assert not np.array_equal(hashing.mix_murmur3(x), hashing.mix_xx(x))
        assert not np.array_equal(hashing.mix_murmur3(x), hashing.mix_splitmix(x))

    def test_hash_with_seed_independent(self):
        base = hashing.hash_strings([f"v{i}" for i in range(500)])
        h1 = hashing.hash_with_seed(base, 1)
        h2 = hashing.hash_with_seed(base, 2)
        assert np.mean(h1 == h2) < 0.01


class TestSignedUnitComponents:
    def test_shape_and_norm(self):
        h = hashing.hash_strings([f"v{i}" for i in range(10)])
        v = hashing.signed_unit_components(h, dim=64)
        assert v.shape == (10, 64)
        np.testing.assert_allclose(np.linalg.norm(v, axis=1), 1.0, rtol=1e-5)

    def test_same_hash_same_vector(self):
        h = hashing.hash_strings(["x", "x"])
        v = hashing.signed_unit_components(h, dim=32)
        np.testing.assert_array_equal(v[0], v[1])

    def test_distinct_hashes_near_orthogonal(self):
        h = hashing.hash_strings([f"v{i}" for i in range(200)])
        v = hashing.signed_unit_components(h, dim=256)
        g = v @ v.T
        off = g[~np.eye(200, dtype=bool)]
        assert abs(off.mean()) < 0.02
        assert np.abs(off).max() < 0.35

    def test_seed_changes_vectors(self):
        h = hashing.hash_strings(["x"])
        a = hashing.signed_unit_components(h, dim=32, seed=0)
        b = hashing.signed_unit_components(h, dim=32, seed=1)
        assert not np.array_equal(a, b)
