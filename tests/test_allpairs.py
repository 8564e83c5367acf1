"""ALLPAIRS exactness tests — every result goes through the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import datasets
from repro.baselines.allpairs import allpairs
from repro.exact import brute_force_join, exact_join_sql
from repro.oracle import assert_equivalent
from repro.setsynth import collection_to_pandas, collection_to_spark


@pytest.fixture(scope="module")
def dblp(spark):
    sets = datasets.generate("DBLP", seed=0, scale=0.15)
    df = collection_to_spark(spark, sets).cache()
    df.count()
    yield sets, df
    df.unpersist()


class TestExactness:
    @pytest.mark.parametrize(
        "name,lam",
        [
            ("DBLP", 0.5),
            ("DBLP", 0.8),
            ("UNIFORM005", 0.5),
            ("TOKENS10K", 0.7),
            ("AOL", 0.5),
            ("NETFLIX", 0.7),
        ],
    )
    def test_oracle_equivalence(self, spark, name, lam):
        """ALLPAIRS == DuckDB exact join on the same input (the oracle
        catches a wrong prefix length, broken length filter, etc.)."""
        sets = datasets.generate(name, seed=0, scale=0.12)
        df = collection_to_spark(spark, sets)
        ap = allpairs(spark, df, lam)
        assert_equivalent(
            ap.pairs, exact_join_sql(lam), sets=collection_to_pandas(sets)
        )

    @pytest.mark.parametrize("lam", [0.5, 0.6, 0.7, 0.9])
    def test_matches_brute_force(self, spark, dblp, lam):
        sets, df = dblp
        ap = allpairs(spark, df, lam)
        got = {(r["sid_a"], r["sid_b"]) for r in ap.pairs.collect()}
        assert got == brute_force_join(sets, lam)


class TestStats:
    def test_pipeline_monotonicity(self, spark, dblp):
        _, df = dblp
        ap = allpairs(spark, df, 0.5)
        st = ap.stats
        assert st.pre_candidates >= st.candidates >= st.results
        assert st.results == ap.n_results

    def test_higher_threshold_fewer_precandidates(self, spark, dblp):
        _, df = dblp
        lo = allpairs(spark, df, 0.5)
        hi = allpairs(spark, df, 0.9)
        # Shorter prefixes + stricter length filter at lam = 0.9.
        assert hi.stats.pre_candidates < lo.stats.pre_candidates
        assert hi.n_results <= lo.n_results


class TestValidation:
    @pytest.mark.parametrize("lam", [0.0, 1.0, -1.0])
    def test_invalid_lambda_raises(self, spark, dblp, lam):
        _, df = dblp
        with pytest.raises(ValueError):
            allpairs(spark, df, lam)

    def test_pairs_ordered_and_distinct(self, spark, dblp):
        _, df = dblp
        ap = allpairs(spark, df, 0.5)
        assert ap.pairs.filter(F.col("sid_a") >= F.col("sid_b")).count() == 0
        assert ap.pairs.count() == ap.pairs.distinct().count()
