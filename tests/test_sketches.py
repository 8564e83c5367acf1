"""Unit tests for 1-bit sketch similarity estimation and calibration."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.minhash import MinHasher
from repro.core.sketches import (
    estimate_jaccard,
    matching_bits,
    popcount,
    sketch_pass,
    sketch_threshold,
)


class TestPopcount:
    @given(st.lists(st.integers(0, 2**64 - 1), min_size=1, max_size=50))
    @settings(max_examples=50, deadline=None)
    def test_matches_python_bin(self, vals):
        arr = np.array(vals, dtype=np.uint64)
        expected = np.array([bin(v).count("1") for v in vals])
        np.testing.assert_array_equal(popcount(arr), expected)

    def test_zero_and_all_ones(self):
        arr = np.array([0, 0xFFFFFFFFFFFFFFFF], dtype=np.uint64)
        np.testing.assert_array_equal(popcount(arr), [0, 64])

    def test_2d_shape(self):
        arr = np.array([[1, 3], [7, 15]], dtype=np.uint64)
        np.testing.assert_array_equal(popcount(arr), [[1, 2], [3, 4]])


class TestMatchingBits:
    def test_identical(self):
        sk = np.array([[123456789, 987654321]], dtype=np.uint64)
        assert matching_bits(sk[0], sk[0]) == 128

    def test_complement(self):
        a = np.array([0], dtype=np.uint64)
        b = np.array([0xFFFFFFFFFFFFFFFF], dtype=np.uint64)
        assert matching_bits(a, b) == 0

    def test_batched(self):
        a = np.zeros((3, 2), dtype=np.uint64)
        b = np.zeros((3, 2), dtype=np.uint64)
        b[1, 0] = 0xF
        out = matching_bits(a, b)
        np.testing.assert_array_equal(out, [128, 124, 128])


class TestEstimate:
    def test_identical_is_one(self):
        sk = np.array([5, 10, 20, 40], dtype=np.uint64)
        assert estimate_jaccard(sk, sk) == 1.0

    def test_range(self):
        rng = np.random.default_rng(0)
        a = rng.integers(0, 2**63, (20, 4)).astype(np.uint64)
        b = rng.integers(0, 2**63, (20, 4)).astype(np.uint64)
        est = estimate_jaccard(a, b)
        assert np.all(est >= -1.0) and np.all(est <= 1.0)

    def test_random_sketches_estimate_near_zero(self):
        rng = np.random.default_rng(1)
        a = rng.integers(0, 2**63, (1, 64)).astype(np.uint64) * 2 + 1
        b = rng.integers(0, 2**63, (1, 64)).astype(np.uint64) * 2
        est = estimate_jaccard(a, b)
        assert abs(float(est[0])) < 0.2


class TestThreshold:
    @pytest.mark.parametrize("lam", [0.3, 0.5, 0.7, 0.9])
    def test_below_lam(self, lam):
        # The cutoff must sit below lam (it tolerates downward noise).
        assert sketch_threshold(lam, 0.05, 512) < lam

    def test_monotone_in_delta(self):
        # Smaller delta -> more tolerance -> lower cutoff.
        t1 = sketch_threshold(0.5, 0.01, 512)
        t2 = sketch_threshold(0.5, 0.2, 512)
        assert t1 < t2

    def test_monotone_in_nbits(self):
        # More bits -> tighter estimate -> cutoff closer to lam.
        t1 = sketch_threshold(0.5, 0.05, 64)
        t2 = sketch_threshold(0.5, 0.05, 1024)
        assert t1 < t2 < 0.5

    def test_delta_one_disables(self):
        assert sketch_threshold(0.5, 1.0, 512) == -1.0

    @pytest.mark.parametrize("lam", [0.0, 1.0, -0.2, 1.5])
    def test_invalid_lam_raises(self, lam):
        with pytest.raises(ValueError):
            sketch_threshold(lam, 0.05, 512)


class TestFalseNegativeRate:
    @pytest.mark.parametrize("lam", [0.5, 0.7])
    def test_fn_rate_at_most_delta(self, lam):
        """Pairs with J == lam must pass the filter w.p. >= 1 - delta."""
        delta = 0.05
        rng = np.random.default_rng(3)
        d, s = 5000, 60
        # ceil keeps the constructed J at or above lam (round could dip
        # below, where the guarantee does not apply).
        o = int(np.ceil(2 * s * lam / (1 + lam)))
        n_trials, fn = 300, 0
        h = MinHasher(t=1, ell=8, seed=9)
        for trial in range(n_trials):
            base = rng.choice(d, size=2 * s - o, replace=False)
            x, y = np.sort(base[:s]), np.sort(base[s - o:])
            _, sk = h.embed_many([x, y])
            if not sketch_pass(sk[0:1], sk[1:2], lam, delta)[0]:
                fn += 1
        # Binomial(300, 0.05) has mean 15, sd ~3.8; allow ~3 sd.
        assert fn <= n_trials * delta + 3 * np.sqrt(n_trials * delta)

    def test_dissimilar_pairs_mostly_pruned(self):
        rng = np.random.default_rng(4)
        h = MinHasher(t=1, ell=8, seed=9)
        pruned = 0
        for trial in range(100):
            x = np.sort(rng.choice(10000, size=60, replace=False))
            y = np.sort(rng.choice(10000, size=60, replace=False))
            _, sk = h.embed_many([x, y])
            if not sketch_pass(sk[0:1], sk[1:2], 0.5, 0.05)[0]:
                pruned += 1
        assert pruned >= 95

    def test_ell_zero_passes_everything(self):
        sk = np.empty((5, 0), dtype=np.uint64)
        assert sketch_pass(sk, sk, 0.5, 0.05).all()
