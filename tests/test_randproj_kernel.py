"""Random-projection kernel: cosine estimator accuracy (no Spark)."""
import numpy as np
import pytest

from repro.core.randproj import (
    bit_signature,
    estimate_cosine,
    exact_cosine,
    hyperplanes,
)

PLANES = hyperplanes(256, 50, seed=11)
RNG = np.random.default_rng(3)


class TestBitSignature:
    def test_length_and_dtype(self):
        sig = bit_signature(RNG.standard_normal(50), PLANES)
        assert sig.shape == (256,)
        assert set(np.unique(sig)) <= {0, 1}

    def test_deterministic(self):
        v = RNG.standard_normal(50)
        assert np.array_equal(bit_signature(v, PLANES), bit_signature(v, PLANES))

    def test_scale_invariant(self):
        v = RNG.standard_normal(50)
        assert np.array_equal(bit_signature(v, PLANES), bit_signature(5.0 * v, PLANES))

    def test_negation_flips_all_bits(self):
        v = RNG.standard_normal(50)
        s1, s2 = bit_signature(v, PLANES), bit_signature(-v, PLANES)
        # sign(x) >= 0 keeps exact zeros, but those have measure ~0 here
        assert np.mean(s1 != s2) > 0.99


class TestCosineEstimate:
    def test_identical_vectors(self):
        v = RNG.standard_normal(50)
        sig = bit_signature(v, PLANES)
        assert estimate_cosine(sig, sig) == pytest.approx(1.0)

    def test_opposite_vectors(self):
        v = RNG.standard_normal(50)
        est = estimate_cosine(bit_signature(v, PLANES), bit_signature(-v, PLANES))
        assert est < -0.95

    def test_orthogonal_vectors_near_zero(self):
        a = np.zeros(50)
        a[0] = 1.0
        b = np.zeros(50)
        b[1] = 1.0
        est = estimate_cosine(bit_signature(a, PLANES), bit_signature(b, PLANES))
        assert abs(est) < 0.2

    @pytest.mark.parametrize("seed", range(6))
    def test_estimate_tracks_exact(self, seed):
        rng = np.random.default_rng(seed)
        a = rng.standard_normal(50)
        b = 0.6 * a + 0.8 * rng.standard_normal(50)
        est = estimate_cosine(bit_signature(a, PLANES), bit_signature(b, PLANES))
        assert abs(est - exact_cosine(a, b)) < 0.2


class TestExactCosine:
    def test_zero_vector_safe(self):
        assert exact_cosine(np.zeros(5), np.ones(5)) == 0.0

    def test_unit_parallel(self):
        v = np.ones(4)
        assert exact_cosine(v, 2 * v) == pytest.approx(1.0)

    def test_antiparallel(self):
        v = np.ones(4)
        assert exact_cosine(v, -v) == pytest.approx(-1.0)


class TestHyperplanes:
    def test_shape(self):
        assert hyperplanes(16, 8, seed=1).shape == (16, 8)

    def test_seeded(self):
        assert np.array_equal(hyperplanes(8, 4, seed=2), hyperplanes(8, 4, seed=2))
        assert not np.array_equal(hyperplanes(8, 4, seed=2), hyperplanes(8, 4, seed=3))
