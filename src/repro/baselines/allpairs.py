"""ALLPAIRS — exact prefix-filtering set similarity join (Bayardo et al.).

The paper's exact baseline (via Mann et al.'s study, where the basic
prefix filter "ALL" is the overall winner).  Distributed formulation:

1. order tokens globally by ascending document frequency (rarest first)
   and re-rank every set's tokens in that order;
2. each set exposes its *prefix*: the first ``|x| - ceil(lam * |x|) + 1``
   ranked tokens — any pair with ``J >= lam`` must share a token within
   both prefixes (the shared token of minimum global rank does the job,
   given the length filter ``|small| >= lam * |big|``);
3. inverted-index join: explode prefixes, self-join on token rank with
   ``sid_a < sid_b`` plus the length filter -> pre-candidates;
4. distinct pairs -> candidates; exact Jaccard verification -> results.

Counters follow Table IV: pre-candidates are size-feasible index hits,
candidates are distinct pre-candidates, results are verified pairs.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..core.cpsjoin_local import JoinStats
from ..core.verify import jaccard

__all__ = ["AllPairsResult", "allpairs"]

_PAIR_SCHEMA = T.StructType(
    [
        T.StructField("sid_a", T.LongType(), False),
        T.StructField("sid_b", T.LongType(), False),
    ]
)


@dataclass
class AllPairsResult:
    """Exact join output + pipeline counters."""

    pairs: DataFrame  # (sid_a, sid_b), sid_a < sid_b, distinct
    stats: JoinStats
    n_results: int


def _ranked_sets(sets_df: DataFrame) -> DataFrame:
    """Rewrite each set's tokens as global-frequency ranks (rarest = 0)."""
    tok = sets_df.select("sid", F.explode("tokens").alias("token"))
    freq = tok.groupBy("token").agg(F.count("*").alias("df"))
    rank = freq.withColumn(
        "rank",
        F.row_number().over(Window.orderBy(F.asc("df"), F.asc("token"))) - 1,
    ).select("token", "rank")
    return (
        tok.join(rank, "token")
        .groupBy("sid")
        .agg(F.sort_array(F.collect_list("rank")).alias("rtokens"))
        .withColumn("size", F.size("rtokens"))
    )


def allpairs(spark: SparkSession, sets_df: DataFrame, lam: float) -> AllPairsResult:
    """Exact self-join ``{(a, b) : J >= lam}`` with prefix filtering; eager."""
    if not 0 < lam < 1:
        raise ValueError(f"lam must be in (0,1), got {lam}")
    ranked = _ranked_sets(sets_df).cache()
    prefix_len = (F.col("size") - F.ceil(lam * F.col("size")) + 1).cast("int")
    prefix = ranked.select(
        "sid",
        "size",
        F.explode(F.slice("rtokens", 1, prefix_len)).alias("rank"),
    )

    left = prefix.select(
        F.col("rank"),
        F.col("sid").alias("sid_a"),
        F.col("size").alias("size_a"),
    )
    right = prefix.select(
        F.col("rank"),
        F.col("sid").alias("sid_b"),
        F.col("size").alias("size_b"),
    )
    pre_pairs = (
        left.join(right, "rank")
        .filter(F.col("sid_a") < F.col("sid_b"))
        .filter(
            F.least("size_a", "size_b") >= lam * F.greatest("size_a", "size_b")
        )
        .select("sid_a", "sid_b")
        .cache()
    )
    n_pre = pre_pairs.count()
    cand = pre_pairs.distinct().cache()
    n_cand = cand.count()

    sides = cand.join(
        ranked.select(F.col("sid").alias("sid_a"), F.col("rtokens").alias("ta")),
        "sid_a",
    ).join(
        ranked.select(F.col("sid").alias("sid_b"), F.col("rtokens").alias("tb")),
        "sid_b",
    )

    def verify(batches):
        for pdf in batches:
            keep_a, keep_b = [], []
            for a, b, ta, tb in zip(
                pdf["sid_a"].tolist(), pdf["sid_b"].tolist(),
                pdf["ta"].tolist(), pdf["tb"].tolist(),
            ):
                if jaccard(
                    np.asarray(ta, dtype=np.int64), np.asarray(tb, dtype=np.int64)
                ) >= lam:
                    keep_a.append(int(a))
                    keep_b.append(int(b))
            yield pd.DataFrame(
                {
                    "sid_a": np.asarray(keep_a, dtype=np.int64),
                    "sid_b": np.asarray(keep_b, dtype=np.int64),
                }
            )

    pairs = sides.mapInPandas(verify, schema=_PAIR_SCHEMA).cache()
    n_res = pairs.count()
    ranked.unpersist()
    pre_pairs.unpersist()
    cand.unpersist()
    return AllPairsResult(
        pairs=pairs,
        stats=JoinStats(n_pre, n_cand, n_res),
        n_results=n_res,
    )
