"""Unit tests for the MinHash embedding + 1-bit sketch kernel.

The load-bearing property for every downstream component is the
collision law ``Pr[mh_i(x) = mh_i(y)] ~= J(x, y)``; it is validated
empirically here with fixed seeds and generous-but-meaningful
tolerances.
"""
import numpy as np
import pytest

from repro.core.minhash import MinHasher, pack_bits


def _pair_with_jaccard(d: int, s: int, j: float, seed: int = 0):
    """Two sets of size ``s`` from [d] with exact overlap for J ~= j."""
    rng = np.random.default_rng(seed)
    o = int(round(2 * s * j / (1 + j)))
    base = rng.choice(d, size=2 * s - o, replace=False)
    x = np.sort(base[:s])
    y = np.sort(base[s - o:])
    return x, y


class TestConstruction:
    def test_rejects_bad_t(self):
        with pytest.raises(ValueError):
            MinHasher(t=0)

    def test_rejects_bad_ell(self):
        with pytest.raises(ValueError):
            MinHasher(t=4, ell=-1)

    @pytest.mark.parametrize("t,ell", [(1, 0), (4, 1), (64, 8), (128, 2)])
    def test_function_count(self, t, ell):
        h = MinHasher(t=t, ell=ell, seed=0)
        assert h.n_funcs == t + 64 * ell

    def test_deterministic_in_seed(self):
        a = MinHasher(t=16, ell=2, seed=7)
        b = MinHasher(t=16, ell=2, seed=7)
        x = np.array([3, 9, 27])
        np.testing.assert_array_equal(a.embed_one(x)[0], b.embed_one(x)[0])
        np.testing.assert_array_equal(a.embed_one(x)[1], b.embed_one(x)[1])

    def test_different_seeds_differ(self):
        x = np.arange(50)
        a = MinHasher(t=32, ell=1, seed=1).embed_one(x)[0]
        b = MinHasher(t=32, ell=1, seed=2).embed_one(x)[0]
        assert not np.array_equal(a, b)


class TestEmbedding:
    @pytest.mark.parametrize("t,ell", [(8, 0), (16, 1), (64, 8)])
    def test_shapes_and_dtypes(self, t, ell):
        h = MinHasher(t=t, ell=ell, seed=0)
        sets = [np.array([1, 2, 3]), np.array([7]), np.arange(10, 40)]
        mh, sk = h.embed_many(sets)
        assert mh.shape == (3, t) and mh.dtype == np.int64
        assert sk.shape == (3, ell) and sk.dtype == np.uint64

    def test_embed_one_matches_batch(self):
        h = MinHasher(t=32, ell=2, seed=3)
        sets = [np.array([5, 6, 7]), np.arange(100, 130)]
        mh, sk = h.embed_many(sets)
        for i, x in enumerate(sets):
            m1, s1 = h.embed_one(x)
            np.testing.assert_array_equal(m1, mh[i])
            np.testing.assert_array_equal(s1, sk[i])

    def test_empty_batch(self):
        mh, sk = MinHasher(t=4, ell=1, seed=0).embed_many([])
        assert mh.shape == (0, 4) and sk.shape == (0, 1)

    def test_empty_set_raises(self):
        with pytest.raises(ValueError):
            MinHasher(t=4, ell=0, seed=0).embed_many([np.array([], dtype=np.int64)])

    def test_order_invariant(self):
        h = MinHasher(t=32, ell=2, seed=0)
        x = np.array([9, 2, 77, 31])
        m1, s1 = h.embed_one(x)
        m2, s2 = h.embed_one(x[::-1].copy())
        np.testing.assert_array_equal(m1, m2)
        np.testing.assert_array_equal(s1, s2)

    def test_identical_sets_identical_embeddings(self):
        h = MinHasher(t=16, ell=2, seed=0)
        mh, sk = h.embed_many([np.arange(20), np.arange(20)])
        np.testing.assert_array_equal(mh[0], mh[1])
        np.testing.assert_array_equal(sk[0], sk[1])

    def test_disjoint_sets_rarely_collide(self):
        h = MinHasher(t=256, ell=0, seed=0)
        mh, _ = h.embed_many([np.arange(0, 50), np.arange(100, 150)])
        # J = 0: collisions only by 64-bit hash accident.
        assert (mh[0] == mh[1]).sum() <= 1


class TestCollisionLaw:
    @pytest.mark.parametrize("j", [0.2, 0.5, 0.7, 0.9])
    def test_coordinate_collision_rate_tracks_jaccard(self, j):
        x, y = _pair_with_jaccard(d=10000, s=100, j=j, seed=42)
        inter = len(np.intersect1d(x, y))
        true_j = inter / (len(x) + len(y) - inter)
        h = MinHasher(t=2048, ell=0, seed=11)
        mh, _ = h.embed_many([x, y])
        rate = (mh[0] == mh[1]).mean()
        assert abs(rate - true_j) < 0.05

    @pytest.mark.parametrize("j", [0.3, 0.6, 0.9])
    def test_sketch_bit_agreement_tracks_jaccard(self, j):
        x, y = _pair_with_jaccard(d=10000, s=200, j=j, seed=5)
        inter = len(np.intersect1d(x, y))
        true_j = inter / (len(x) + len(y) - inter)
        h = MinHasher(t=1, ell=32, seed=13)  # 2048 sketch bits
        _, sk = h.embed_many([x, y])
        bits = np.unpackbits(sk.view(np.uint8), bitorder="little").reshape(2, -1)
        agree = (bits[0] == bits[1]).mean()
        assert abs(agree - (1 + true_j) / 2) < 0.05


class TestPackBits:
    def test_roundtrip(self):
        rng = np.random.default_rng(0)
        bits = rng.integers(0, 2, 128).astype(np.uint8)
        words = pack_bits(bits)
        assert words.shape == (2,) and words.dtype == np.uint64
        back = np.unpackbits(words.view(np.uint8), bitorder="little")
        np.testing.assert_array_equal(back, bits)

    def test_rejects_non_multiple_of_64(self):
        with pytest.raises(ValueError):
            pack_bits(np.zeros(65, dtype=np.uint8))

    def test_all_ones(self):
        words = pack_bits(np.ones(64, dtype=np.uint8))
        assert words[0] == np.uint64(0xFFFFFFFFFFFFFFFF)

    def test_batch_axis(self):
        bits = np.zeros((3, 64), dtype=np.uint8)
        bits[1, 0] = 1
        words = pack_bits(bits)
        assert words.shape == (3, 1)
        assert words[1, 0] == 1 and words[0, 0] == 0
