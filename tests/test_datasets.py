"""Tests for the 14-dataset registry (Table I clones)."""
import numpy as np
import pytest

from repro import datasets

ALL = list(datasets.DATASETS)


class TestRegistry:
    def test_fourteen_datasets(self):
        assert len(ALL) == 14

    def test_names_match_paper(self):
        expected = {
            "AOL", "BMS-POS", "DBLP", "ENRON", "FLICKR", "KOSARAK",
            "LIVEJ", "NETFLIX", "ORKUT", "SPOTIFY", "UNIFORM005",
            "TOKENS10K", "TOKENS15K", "TOKENS20K",
        }
        assert set(ALL) == expected

    @pytest.mark.parametrize("name", ALL)
    def test_paper_stats_present(self, name):
        paper = datasets.paper_stats(name)
        assert paper["n_millions"] > 0
        assert paper["avg_size"] > 1
        assert paper["sets_per_token"] > 0

    @pytest.mark.parametrize("name", ALL)
    def test_spec_consistency(self, name):
        spec = datasets.DATASETS[name]
        if spec.kind == "zipf":
            assert spec.d >= 2 * spec.avg_size  # sets must fit the universe
            assert spec.n >= 150
        else:
            assert spec.cap > 0 and spec.d == 1000


class TestGenerate:
    @pytest.mark.parametrize("name", ALL)
    def test_generates_valid_collection(self, name):
        sets = datasets.generate(name, seed=0, scale=0.15)
        assert len(sets) >= 20
        for x in sets[:50]:
            assert len(x) >= 2
            assert np.all(np.diff(x) > 0)  # sorted unique

    @pytest.mark.parametrize("name", ALL)
    def test_deterministic(self, name):
        a = datasets.generate(name, seed=3, scale=0.1)
        b = datasets.generate(name, seed=3, scale=0.1)
        assert len(a) == len(b)
        np.testing.assert_array_equal(a[0], b[0])
        np.testing.assert_array_equal(a[-1], b[-1])

    @pytest.mark.parametrize(
        "name", ["AOL", "DBLP", "ENRON", "NETFLIX", "SPOTIFY", "UNIFORM005"]
    )
    def test_avg_size_tracks_spec(self, name):
        spec = datasets.DATASETS[name]
        sets = datasets.generate(name, seed=0, scale=0.3)
        avg = np.mean([len(x) for x in sets])
        assert 0.6 * spec.avg_size <= avg <= 1.4 * spec.avg_size

    def test_scale_changes_size(self):
        small = datasets.generate("FLICKR", seed=0, scale=0.1)
        large = datasets.generate("FLICKR", seed=0, scale=0.5)
        assert len(large) > 2 * len(small)

    def test_unknown_name_raises(self):
        with pytest.raises(KeyError):
            datasets.generate("NOPE")

    @pytest.mark.parametrize("name", ["DBLP", "AOL", "TOKENS10K", "UNIFORM005"])
    def test_exact_join_nonempty_at_half(self, name):
        """Every clone must produce results at lambda = 0.5, or recall
        experiments against it would be vacuous."""
        from repro.exact import brute_force_join

        sets = datasets.generate(name, seed=0, scale=0.2)
        assert len(brute_force_join(sets, 0.5)) > 0


class TestDensityContrast:
    def test_dense_vs_sparse_sets_per_token(self):
        """The registry must preserve the paper's dense/sparse contrast:
        NETFLIX-like clones have tokens in far more sets than AOL-like."""

        def spt(name):
            sets = datasets.generate(name, seed=0, scale=0.3)
            occ = sum(len(x) for x in sets)
            d_used = len(np.unique(np.concatenate(sets)))
            return occ / d_used

        assert spt("NETFLIX") > 10 * spt("AOL")
        assert spt("TOKENS10K") > 5 * spt("SPOTIFY")


class TestSpark:
    @pytest.mark.parametrize("name", ["DBLP", "TOKENS10K"])
    def test_load_spark_schema(self, spark, name):
        df = datasets.load_spark(spark, name, seed=0, scale=0.1)
        assert df.columns == ["sid", "tokens"]
        rows = df.limit(5).collect()
        assert all(len(r["tokens"]) >= 2 for r in rows)
