"""Unit tests for the synthetic set-collection generators."""
import numpy as np
import pytest

from repro.core.verify import jaccard
from repro.setsynth import (
    TOKENS_LEVELS,
    collection_to_pandas,
    dedup_collection,
    plant_pair,
    tokens_collection,
    zipf_collection,
)


class TestDedup:
    def test_removes_duplicates(self):
        sets = [np.array([1, 2]), np.array([2, 1]), np.array([1, 3])]
        out = dedup_collection(sets)
        assert len(out) == 2

    def test_removes_singletons_and_empties(self):
        sets = [np.array([5]), np.array([], dtype=np.int64), np.array([1, 2])]
        out = dedup_collection(sets)
        assert len(out) == 1

    def test_sorts_and_uniquifies_tokens(self):
        out = dedup_collection([np.array([3, 1, 3, 2])])
        np.testing.assert_array_equal(out[0], [1, 2, 3])


class TestPlantPair:
    @pytest.mark.parametrize("j", [0.5, 0.7, 0.9])
    def test_target_jaccard(self, j):
        rng = np.random.default_rng(0)
        base = np.sort(rng.choice(2000, size=100, replace=False))
        partner = plant_pair(rng, base, 2000, j)
        # Discrete overlap: |J_actual - j| bounded by one token's worth.
        assert abs(jaccard(base, partner) - j) < 0.03
        assert len(partner) == len(base)

    def test_never_exact_duplicate(self):
        rng = np.random.default_rng(1)
        base = np.array([1, 2, 3])
        for _ in range(20):
            partner = plant_pair(rng, base, 50, 0.99)
            assert not np.array_equal(partner, base)

    def test_partner_sorted_unique(self):
        rng = np.random.default_rng(2)
        base = np.sort(rng.choice(500, size=40, replace=False))
        partner = plant_pair(rng, base, 500, 0.6)
        np.testing.assert_array_equal(partner, np.unique(partner))


class TestZipfCollection:
    def test_basic_shape(self):
        sets = zipf_collection(200, 10, 500, alpha=0.8, seed=0,
                               planted_per_level=2)
        assert 190 <= len(sets) <= 220  # n + planted - dedup losses
        assert all(len(x) >= 2 for x in sets)
        assert all(x.max() < 500 and x.min() >= 0 for x in sets)

    def test_avg_size_in_tolerance(self):
        sets = zipf_collection(500, 40, 2000, alpha=0.8, seed=1,
                               planted_per_level=0)
        avg = np.mean([len(x) for x in sets])
        assert 0.7 * 40 <= avg <= 1.3 * 40

    def test_deterministic(self):
        a = zipf_collection(100, 8, 300, seed=5)
        b = zipf_collection(100, 8, 300, seed=5)
        assert len(a) == len(b)
        for x, y in zip(a, b):
            np.testing.assert_array_equal(x, y)

    def test_seed_changes_output(self):
        a = zipf_collection(100, 8, 300, seed=5)
        b = zipf_collection(100, 8, 300, seed=6)
        assert any(
            len(x) != len(y) or not np.array_equal(x, y) for x, y in zip(a, b)
        )

    def test_planted_pairs_exist(self):
        from repro.exact import brute_force_join

        sets = zipf_collection(300, 20, 3000, alpha=0.9, seed=0,
                               planted_per_level=8)
        # Sparse universe: without planting, J >= 0.5 pairs are rare;
        # with 8 per level the exact join must be non-trivial.
        truth = brute_force_join(sets, 0.5)
        assert len(truth) >= 8

    def test_zipf_skew_concentrates_tokens(self):
        skewed = zipf_collection(300, 10, 1000, alpha=1.2, seed=0,
                                 planted_per_level=0)
        flat = zipf_collection(300, 10, 1000, alpha=0.0, seed=0,
                               planted_per_level=0)
        cnt_s = np.bincount(np.concatenate(skewed), minlength=1000)
        cnt_f = np.bincount(np.concatenate(flat), minlength=1000)
        # Top-10 token share must be visibly higher under skew.
        share_s = np.sort(cnt_s)[-10:].sum() / cnt_s.sum()
        share_f = np.sort(cnt_f)[-10:].sum() / cnt_f.sum()
        assert share_s > 2 * share_f

    def test_too_small_universe_raises(self):
        with pytest.raises(ValueError):
            zipf_collection(10, 2, 3, seed=0)


class TestTokensCollection:
    def test_capacity_respected(self):
        sets = tokens_collection(30, d=400, seed=0, planted_per_level=2)
        counts = np.bincount(np.concatenate(sets), minlength=400)
        assert counts.max() <= 30

    def test_background_size(self):
        sets = tokens_collection(40, d=500, seed=1, planted_per_level=0)
        # Background size = 2*0.2*d/1.2 = d/3.
        expected = int(round(500 / 3))
        assert all(len(x) == expected for x in sets)

    def test_total_occupancy_near_capacity(self):
        cap, d = 30, 400
        sets = tokens_collection(cap, d=d, seed=2, planted_per_level=0)
        occupancy = sum(len(x) for x in sets)
        assert occupancy >= 0.85 * cap * d

    def test_planted_levels_have_expected_similarity(self):
        sets = tokens_collection(60, d=1000, seed=3, planted_per_level=3)
        # First 3 sets belong to level 0.95 with size 2*0.95*1000/1.95.
        s95 = int(round(2 * 0.95 * 1000 / 1.95))
        level0 = [x for x in sets if len(x) == s95]
        assert len(level0) >= 2
        j = jaccard(level0[0], level0[1])
        assert abs(j - 0.95) < 0.05

    def test_deterministic(self):
        a = tokens_collection(25, d=300, seed=7)
        b = tokens_collection(25, d=300, seed=7)
        assert len(a) == len(b)
        for x, y in zip(a, b):
            np.testing.assert_array_equal(x, y)

    def test_level_sizes_follow_formula(self):
        sets = tokens_collection(80, d=1000, seed=4, planted_per_level=1)
        sizes = sorted({len(x) for x in sets}, reverse=True)
        expected = sorted(
            {int(round(2 * j * 1000 / (1 + j))) for j in TOKENS_LEVELS}
            | {int(round(2 * 0.2 * 1000 / 1.2))},
            reverse=True,
        )
        assert set(sizes) <= set(expected)


class TestAdapters:
    def test_pandas_schema(self):
        pdf = collection_to_pandas([np.array([3, 1]), np.array([2, 5, 7])])
        assert list(pdf.columns) == ["sid", "tokens"]
        assert pdf["sid"].tolist() == [0, 1]
        assert isinstance(pdf["tokens"].iloc[0], list)
