"""Tests for the MinHash LSH join baseline."""
import pytest
from pyspark.sql import functions as F

from repro import datasets
from repro.baselines.minhash_lsh import (
    choose_k,
    minhash_lsh_join,
    reps_for_recall,
)
from repro.core.preprocess import preprocess
from repro.exact import brute_force_join, precision, recall
from repro.setsynth import collection_to_spark


@pytest.fixture(scope="module")
def dblp(spark):
    sets = datasets.generate("DBLP", seed=0, scale=0.2)
    df = collection_to_spark(spark, sets).cache()
    df.count()
    yield sets, df
    df.unpersist()


class TestRepsFormula:
    def test_known_values(self):
        # ln(10) / 0.5^2 = 9.21 -> 10 reps.
        assert reps_for_recall(0.5, 2, 0.9) == 10
        # ln(10) / 0.9^1 = 2.56 -> 3 reps.
        assert reps_for_recall(0.9, 1, 0.9) == 3

    def test_monotone_in_k(self):
        assert reps_for_recall(0.5, 4, 0.9) >= reps_for_recall(0.5, 2, 0.9)

    def test_cap(self):
        assert reps_for_recall(0.5, 10, 0.99, cap=16) == 16


class TestChooseK:
    def test_in_range(self, spark, dblp):
        _, df = dblp
        pre = preprocess(df, t=12, ell=2, seed=0).cache()
        k = choose_k(spark, pre, 0.5)
        pre.unpersist()
        assert 2 <= k <= 10

    def test_deterministic(self, spark, dblp):
        _, df = dblp
        pre = preprocess(df, t=12, ell=2, seed=0).cache()
        assert choose_k(spark, pre, 0.7) == choose_k(spark, pre, 0.7)
        pre.unpersist()


class TestJoin:
    @pytest.mark.parametrize("name", ["DBLP", "UNIFORM005"])
    def test_recall_and_precision(self, spark, name):
        sets = datasets.generate(name, seed=0, scale=0.2)
        df = collection_to_spark(spark, sets)
        truth = brute_force_join(sets, 0.5)
        assert truth
        res = minhash_lsh_join(spark, df, 0.5, k=3, ell=8, seed=1)
        assert precision(res.pairs, truth) == 1.0
        assert recall(res.pairs, truth) >= 0.85

    def test_first_rep_tracking(self, spark, dblp):
        _, df = dblp
        res = minhash_lsh_join(spark, df, 0.5, k=3, reps=6, ell=8, seed=2)
        assert "first_rep" in res.pairs.columns
        rng = res.pairs.agg(
            F.min("first_rep").alias("lo"), F.max("first_rep").alias("hi")
        ).first()
        if res.n_results:
            assert 0 <= rng["lo"] <= rng["hi"] < 6

    def test_more_reps_more_recall(self, spark, dblp):
        sets, df = dblp
        truth = brute_force_join(sets, 0.5)
        pre = preprocess(df, t=3 * 12, ell=8, seed=3).cache()
        pre.count()
        r_few = minhash_lsh_join(spark, df, 0.5, k=3, reps=2, ell=8, seed=3,
                                 pre=pre)
        r_many = minhash_lsh_join(spark, df, 0.5, k=3, reps=12, ell=8, seed=3,
                                  pre=pre)
        pre.unpersist()
        assert recall(r_many.pairs, truth) >= recall(r_few.pairs, truth)

    def test_stats_monotonicity(self, spark, dblp):
        _, df = dblp
        res = minhash_lsh_join(spark, df, 0.5, k=4, reps=4, ell=8, seed=4)
        st = res.stats
        assert st.pre_candidates >= st.candidates >= st.results
        assert st.results >= res.n_results

    def test_auto_parameterization(self, spark, dblp):
        """With no k/reps given the join must self-parameterize."""
        sets, df = dblp
        truth = brute_force_join(sets, 0.5)
        res = minhash_lsh_join(spark, df, 0.5, ell=8, seed=5)
        assert 2 <= res.k <= 10 and res.reps >= 1
        assert precision(res.pairs, truth) == 1.0
