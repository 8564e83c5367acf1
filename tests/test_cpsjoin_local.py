"""Unit tests for the in-memory CPSJoin recursion (Algorithms 1 & 2)."""
import numpy as np
import pytest

from repro import datasets
from repro.core.cpsjoin_local import (
    JoinStats,
    brute_force_pairs_arrays,
    cpsjoin_local_rep,
)
from repro.core.minhash import MinHasher
from repro.exact import brute_force_join

SMALL = ["DBLP", "UNIFORM005", "NETFLIX", "KOSARAK", "ENRON", "TOKENS10K"]


def _embed(sets, t=64, ell=8, seed=1):
    mh, sk = MinHasher(t=t, ell=ell, seed=seed).embed_many(sets)
    return mh, sk


def _run_reps(sets, lam, reps=10, **kw):
    mh, sk = _embed(sets)
    found: set[tuple[int, int]] = set()
    stats = JoinStats()
    for rep in range(reps):
        pairs, st = cpsjoin_local_rep(mh, sk, sets, lam, seed=rep, **kw)
        found |= {tuple(p) for p in pairs.tolist()}
        stats.merge(st)
    return found, stats


class TestExactSmallCase:
    def test_bruteforce_path_is_exact(self):
        """limit >= n and sketching disabled: output == exact join."""
        sets = datasets.generate("DBLP", seed=0, scale=0.2)
        truth = brute_force_join(sets, 0.5)
        mh, sk = _embed(sets)
        pairs, st = cpsjoin_local_rep(
            mh, sk, sets, 0.5, limit=len(sets) + 1, delta=1.0, seed=0
        )
        assert {tuple(p) for p in pairs.tolist()} == truth
        assert st.pre_candidates == len(sets) * (len(sets) - 1) // 2

    @pytest.mark.parametrize("lam", [0.5, 0.7, 0.9])
    def test_bruteforce_path_all_thresholds(self, lam):
        sets = datasets.generate("UNIFORM005", seed=1, scale=0.2)
        truth = brute_force_join(sets, lam)
        mh, sk = _embed(sets)
        pairs, _ = cpsjoin_local_rep(
            mh, sk, sets, lam, limit=len(sets) + 1, delta=1.0, seed=0
        )
        assert {tuple(p) for p in pairs.tolist()} == truth


class TestPrecision:
    @pytest.mark.parametrize("name", SMALL)
    @pytest.mark.parametrize("lam", [0.5, 0.7])
    def test_every_reported_pair_is_correct(self, name, lam):
        sets = datasets.generate(name, seed=0, scale=0.15)
        truth = brute_force_join(sets, lam)
        found, _ = _run_reps(sets, lam, reps=3)
        assert found <= truth  # 100% precision by construction


class TestRecall:
    @pytest.mark.parametrize("name", ["DBLP", "NETFLIX", "UNIFORM005", "TOKENS10K"])
    def test_ten_reps_reach_90_percent(self, name):
        sets = datasets.generate(name, seed=0, scale=0.25)
        truth = brute_force_join(sets, 0.5)
        assert truth, "clone generator must produce similar pairs"
        found, _ = _run_reps(sets, 0.5, reps=10)
        assert len(found & truth) / len(truth) >= 0.9

    def test_more_reps_never_lose_pairs(self):
        sets = datasets.generate("DBLP", seed=0, scale=0.2)
        f3, _ = _run_reps(sets, 0.5, reps=3)
        f10, _ = _run_reps(sets, 0.5, reps=10)
        assert f3 <= f10  # rep r is seeded identically in both runs


class TestDeterminism:
    def test_same_seed_same_output(self):
        sets = datasets.generate("KOSARAK", seed=0, scale=0.2)
        mh, sk = _embed(sets)
        p1, s1 = cpsjoin_local_rep(mh, sk, sets, 0.5, seed=123)
        p2, s2 = cpsjoin_local_rep(mh, sk, sets, 0.5, seed=123)
        np.testing.assert_array_equal(p1, p2)
        assert s1.as_tuple() == s2.as_tuple()


class TestEdgeCases:
    def test_empty_input(self):
        pairs, st = cpsjoin_local_rep(
            np.empty((0, 4), dtype=np.int64),
            np.empty((0, 1), dtype=np.uint64),
            [], 0.5, seed=0,
        )
        assert pairs.shape == (0, 2) and st.as_tuple() == (0, 0, 0)

    def test_single_record(self):
        sets = [np.array([1, 2, 3])]
        mh, sk = _embed(sets)
        pairs, st = cpsjoin_local_rep(mh, sk, sets, 0.5, seed=0)
        assert len(pairs) == 0 and st.pre_candidates == 0

    def test_two_identical_minus_one(self):
        sets = [np.array([1, 2, 3, 4]), np.array([1, 2, 3, 5])]
        mh, sk = _embed(sets)
        pairs, _ = cpsjoin_local_rep(mh, sk, sets, 0.5, delta=1.0, seed=0)
        assert {tuple(p) for p in pairs.tolist()} == {(0, 1)}

    def test_near_duplicate_heavy_group_terminates(self):
        """A group of near-identical sets must terminate via the
        BRUTEFORCEPOINT rule (avg similarity ~1), not recurse forever."""
        base = np.arange(100)
        sets = [np.sort(np.concatenate([base[:95], [200 + i, 300 + i]]))
                for i in range(60)]
        mh, sk = _embed(sets)
        pairs, st = cpsjoin_local_rep(
            mh, sk, sets, 0.5, limit=10, eps=0.1, delta=1.0, seed=0
        )
        truth = brute_force_join(sets, 0.5)
        assert {tuple(p) for p in pairs.tolist()} == truth


class TestStats:
    def test_pipeline_monotonicity(self):
        sets = datasets.generate("DBLP", seed=0, scale=0.25)
        _, st = _run_reps(sets, 0.5, reps=5)
        assert st.pre_candidates >= st.candidates >= st.results > 0

    def test_results_counter_counts_duplicates(self):
        """Raw results counter >= number of distinct verified pairs."""
        sets = datasets.generate("DBLP", seed=0, scale=0.25)
        found, st = _run_reps(sets, 0.5, reps=10)
        assert st.results >= len(found)

    def test_merge(self):
        a = JoinStats(10, 5, 2)
        a.merge(JoinStats(1, 1, 1))
        assert a.as_tuple() == (11, 6, 3)


class TestEpsilonBehavior:
    def test_large_eps_brute_forces_more(self):
        """eps -> 1 makes every point exceed the removal threshold, so
        the whole node is handled by BRUTEFORCEPOINT: full recall."""
        sets = datasets.generate("UNIFORM005", seed=2, scale=0.2)
        truth = brute_force_join(sets, 0.5)
        mh, sk = _embed(sets)
        pairs, _ = cpsjoin_local_rep(
            mh, sk, sets, 0.5, limit=2, eps=0.999, delta=1.0, seed=0
        )
        assert {tuple(p) for p in pairs.tolist()} >= truth


class TestBruteForcePairsArrays:
    def test_matches_truth_with_sketch_disabled(self):
        sets = datasets.generate("KOSARAK", seed=3, scale=0.2)
        truth = brute_force_join(sets, 0.6)
        mh, sk = _embed(sets)
        pairs, st = brute_force_pairs_arrays(None, sk, sets, 0.6, delta=1.0)
        assert {tuple(p) for p in pairs.tolist()} == truth
        n = len(sets)
        assert st.pre_candidates == n * (n - 1) // 2

    def test_sketch_check_keeps_high_recall(self):
        sets = datasets.generate("DBLP", seed=0, scale=0.2)
        truth = brute_force_join(sets, 0.5)
        assert truth
        mh, sk = _embed(sets)
        pairs, _ = brute_force_pairs_arrays(None, sk, sets, 0.5, delta=0.05)
        got = {tuple(p) for p in pairs.tolist()}
        assert got <= truth
        assert len(got & truth) / len(truth) >= 0.9
