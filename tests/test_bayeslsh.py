"""Tests for the BayesLSH-lite analogue."""
import numpy as np
import pytest

from repro import datasets
from repro.baselines.bayeslsh import bayeslsh_join, incremental_sketch_pass
from repro.core.minhash import MinHasher
from repro.core.sketches import sketch_pass
from repro.exact import brute_force_join, precision, recall
from repro.setsynth import collection_to_spark


class TestIncrementalSketch:
    def test_decision_equals_full_sketch_check(self):
        """The early-terminating check must reach the same accept/reject
        decision as the one-shot sketch filter on every pair."""
        rng = np.random.default_rng(0)
        h = MinHasher(t=1, ell=8, seed=1)
        sets = [np.sort(rng.choice(3000, size=50, replace=False))
                for _ in range(30)]
        # Add near-duplicates so both branches are exercised.
        sets += [np.sort(np.concatenate([s[:45], 3000 + np.arange(5)]))
                 for s in sets[:10]]
        _, sk = h.embed_many(sets)
        for i in range(0, len(sets), 3):
            for j in range(i + 1, len(sets), 7):
                inc, _ = incremental_sketch_pass(sk[i], sk[j], 0.5, 0.05)
                full = bool(sketch_pass(sk[i : i + 1], sk[j : j + 1], 0.5, 0.05)[0])
                assert inc == full

    def test_early_termination_happens(self):
        """Clearly dissimilar sketches must be rejected before reading
        every word."""
        a = np.zeros(8, dtype=np.uint64)
        b = np.full(8, 0xFFFFFFFFFFFFFFFF, dtype=np.uint64)
        passes, words = incremental_sketch_pass(a, b, 0.5, 0.05)
        assert not passes and words < 8

    def test_identical_pass(self):
        a = np.arange(8, dtype=np.uint64)
        passes, _ = incremental_sketch_pass(a, a, 0.9, 0.05)
        assert passes

    def test_ell_zero(self):
        a = np.empty(0, dtype=np.uint64)
        assert incremental_sketch_pass(a, a, 0.5, 0.05) == (True, 0)


class TestJoin:
    def test_precision_and_recall(self, spark):
        sets = datasets.generate("DBLP", seed=0, scale=0.15)
        df = collection_to_spark(spark, sets)
        truth = brute_force_join(sets, 0.5)
        assert truth
        res = bayeslsh_join(spark, df, 0.5, ell=8, seed=1)
        assert precision(res.pairs, truth) == 1.0
        assert recall(res.pairs, truth) >= 0.85

    def test_k1_generates_many_precandidates(self, spark):
        """The k=1 candidate explosion — the reason BayesLSH loses in
        the paper — must be visible in the counters."""
        from repro.baselines.minhash_lsh import minhash_lsh_join

        sets = datasets.generate("DBLP", seed=0, scale=0.15)
        df = collection_to_spark(spark, sets)
        bl = bayeslsh_join(spark, df, 0.5, reps=3, ell=8, seed=2)
        mh = minhash_lsh_join(spark, df, 0.5, k=4, reps=3, ell=8, seed=2)
        assert bl.stats.pre_candidates > mh.stats.pre_candidates
