"""Exact Jaccard verification of candidate pairs.

All four algorithms share one verification kernel, mirroring the paper
(which reuses Mann et al.'s ALLPAIRS verifier everywhere): a candidate
pair is a *result* iff the exact Jaccard similarity of the original
token sets is ``>= lam``.  Token arrays are kept sorted & deduplicated
by the data loaders so intersections are linear merges.
"""
from __future__ import annotations

import numpy as np

__all__ = ["jaccard", "verify_pairs", "size_filter"]


def jaccard(tokens_a: np.ndarray, tokens_b: np.ndarray) -> float:
    """Exact Jaccard similarity of two token arrays (treated as sets)."""
    inter = np.intersect1d(tokens_a, tokens_b, assume_unique=True).size
    union = len(tokens_a) + len(tokens_b) - inter
    return inter / union if union else 1.0


def size_filter(sizes_a: np.ndarray, sizes_b: np.ndarray, lam: float) -> np.ndarray:
    """Pairs that can possibly reach ``J >= lam``: ``lam*|big| <= |small|``."""
    lo = np.minimum(sizes_a, sizes_b)
    hi = np.maximum(sizes_a, sizes_b)
    return lo >= lam * hi


def verify_pairs(tokens, ia: np.ndarray, ib: np.ndarray, lam: float) -> np.ndarray:
    """Exact-verify candidate pairs given by index arrays into ``tokens``.

    ``tokens`` is a sequence of sorted unique token arrays.  Returns a
    boolean mask over the pairs with ``J(tokens[ia], tokens[ib]) >= lam``.
    """
    out = np.empty(len(ia), dtype=bool)
    for k in range(len(ia)):
        out[k] = jaccard(tokens[ia[k]], tokens[ib[k]]) >= lam
    return out
