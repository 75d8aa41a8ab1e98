"""Unit tests for the hashing substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.hashing import HashFamily, fold_rows64, stable_hash64, stable_hash64_array


class TestStableHash:
    def test_deterministic(self):
        assert stable_hash64("hello") == stable_hash64("hello")

    def test_different_inputs_differ(self):
        assert stable_hash64("hello") != stable_hash64("world")

    def test_empty_string_ok(self):
        assert isinstance(stable_hash64(""), int)

    def test_unsigned_64_bit_range(self):
        for s in ["a", "b", "qwerty", "日本語"]:
            h = stable_hash64(s)
            assert 0 <= h < 2**64

    def test_array_matches_scalar(self):
        vals = ["x", "y", "zz"]
        arr = stable_hash64_array(vals)
        assert arr.dtype == np.uint64
        assert [int(a) for a in arr] == [stable_hash64(v) for v in vals]

    @given(st.text(max_size=50))
    @settings(max_examples=50, deadline=None)
    def test_process_independent_shape(self, s):
        h = stable_hash64(s)
        assert 0 <= h < 2**64


class TestHashFamily:
    def test_create_sizes(self):
        fam = HashFamily.create(128, seed=1)
        assert fam.n == 128
        assert fam.a.shape == (128,)
        assert fam.b.shape == (128,)

    def test_a_is_odd(self):
        fam = HashFamily.create(256, seed=2)
        assert np.all(fam.a % 2 == 1)

    def test_deterministic_in_seed(self):
        f1 = HashFamily.create(64, seed=3)
        f2 = HashFamily.create(64, seed=3)
        assert np.array_equal(f1.a, f2.a) and np.array_equal(f1.b, f2.b)

    def test_seeds_differ(self):
        f1 = HashFamily.create(64, seed=3)
        f2 = HashFamily.create(64, seed=4)
        assert not np.array_equal(f1.a, f2.a)

    def test_apply_shape(self):
        fam = HashFamily.create(16, seed=5)
        x = np.arange(10, dtype=np.uint64)
        out = fam.apply(x)
        assert out.shape == (10, 16)
        assert out.dtype == np.uint64

    def test_apply_deterministic(self):
        fam = HashFamily.create(8, seed=6)
        x = np.array([1, 2, 3], dtype=np.uint64)
        assert np.array_equal(fam.apply(x), fam.apply(x))

    def test_distinct_elements_get_distinct_hashes_mostly(self):
        fam = HashFamily.create(1, seed=7)
        x = np.arange(1000, dtype=np.uint64)
        out = fam.apply(x)[:, 0]
        assert len(np.unique(out)) == 1000  # bijection per member


class TestFoldRows:
    def test_shape(self):
        rows = np.arange(24, dtype=np.uint64).reshape(6, 4)
        out = fold_rows64(rows)
        assert out.shape == (6,)

    def test_deterministic(self):
        rows = np.arange(8, dtype=np.uint64).reshape(2, 4)
        assert np.array_equal(fold_rows64(rows), fold_rows64(rows))

    def test_row_order_sensitivity(self):
        a = fold_rows64(np.array([[1, 2, 3, 4]], dtype=np.uint64))
        b = fold_rows64(np.array([[4, 3, 2, 1]], dtype=np.uint64))
        assert a[0] != b[0]

    def test_identical_rows_collide(self):
        rows = np.array([[7, 7, 7, 7], [7, 7, 7, 7]], dtype=np.uint64)
        out = fold_rows64(rows)
        assert out[0] == out[1]

    @given(st.lists(st.integers(0, 2**63), min_size=4, max_size=4))
    @settings(max_examples=30, deadline=None)
    def test_fold_stable_under_repetition(self, vals):
        rows = np.array([vals, vals], dtype=np.uint64)
        out = fold_rows64(rows)
        assert out[0] == out[1]
