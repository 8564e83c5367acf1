"""Tests for the exact-join references (brute force + DuckDB SQL)."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro import datasets
from repro.exact import brute_force_join, exact_join_sql, precision, recall
from repro.setsynth import collection_to_pandas


class TestBruteForce:
    def test_hand_computed(self):
        sets = [
            np.array([1, 2, 3, 4]),   # 0
            np.array([1, 2, 3, 5]),   # 1: J(0,1) = 3/5
            np.array([1, 2]),         # 2: J(0,2) = 1/2, J(1,2) = 1/2
            np.array([10, 11, 12]),   # 3: disjoint
        ]
        assert brute_force_join(sets, 0.5) == {(0, 1), (0, 2), (1, 2)}
        assert brute_force_join(sets, 0.6) == {(0, 1)}
        assert brute_force_join(sets, 0.95) == set()

    def test_threshold_inclusive(self):
        sets = [np.array([1, 2]), np.array([1, 2, 3, 4])]  # J = 0.5
        assert brute_force_join(sets, 0.5) == {(0, 1)}

    def test_empty(self):
        assert brute_force_join([], 0.5) == set()


class TestDuckDBOracleSQL:
    @pytest.mark.parametrize("name", ["DBLP", "UNIFORM005", "TOKENS10K"])
    @pytest.mark.parametrize("lam", [0.5, 0.7])
    def test_sql_matches_brute_force(self, name, lam):
        """The DuckDB formulation and the numpy brute force must agree —
        two independent ground truths cross-checked."""
        sets = datasets.generate(name, seed=0, scale=0.12)
        pdf = collection_to_pandas(sets)
        con = duckdb.connect()
        try:
            con.register("sets", pdf)
            got = con.execute(exact_join_sql(lam)).fetchdf()
        finally:
            con.close()
        sql_pairs = set(zip(got["sid_a"].astype(int), got["sid_b"].astype(int)))
        assert sql_pairs == brute_force_join(sets, lam)


class TestRecallPrecision:
    def test_recall_basic(self):
        truth = {(0, 1), (0, 2), (1, 2)}
        assert recall({(0, 1)}, truth) == pytest.approx(1 / 3)
        assert recall(truth, truth) == 1.0
        assert recall(set(), truth) == 0.0

    def test_empty_truth_is_full_recall(self):
        assert recall({(0, 1)}, set()) == 1.0

    def test_precision_basic(self):
        truth = {(0, 1)}
        assert precision({(0, 1), (5, 6)}, truth) == 0.5
        assert precision(set(), truth) == 1.0

    def test_accepts_pandas(self):
        truth = pd.DataFrame({"sid_a": [0], "sid_b": [1]})
        got = pd.DataFrame({"sid_a": [0, 2], "sid_b": [1, 3]})
        assert recall(got, truth) == 1.0
        assert precision(got, truth) == 0.5
