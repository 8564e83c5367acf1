"""1-bit minwise sketch similarity estimation (paper §V-A2).

For 1-bit minwise sketches the probability that a bit agrees between two
sets is ``(1 + J) / 2``, so from a matching-bit fraction ``m`` the
Jaccard estimate is ``J_hat = 2m - 1``.  A pair is pruned when
``J_hat < lambda_hat``, where ``lambda_hat`` is calibrated so that a
true-positive pair (``J >= lam``) is pruned with probability < ``delta``
(paper uses ``delta = 0.05``).
"""
from __future__ import annotations

from statistics import NormalDist

import numpy as np

__all__ = [
    "popcount",
    "matching_bits",
    "estimate_jaccard",
    "sketch_threshold",
    "sketch_pass",
]

# Byte-popcount lookup table; numpy < 2.0 has no np.bitwise_count.
_POP8 = np.array([bin(i).count("1") for i in range(256)], dtype=np.uint8)


def popcount(words: np.ndarray) -> np.ndarray:
    """Popcount of each uint64 in ``words`` (any shape), returned as int64."""
    b = np.ascontiguousarray(words, dtype=np.uint64).view(np.uint8)
    counts = _POP8[b].reshape(*words.shape, 8).sum(axis=-1, dtype=np.int64)
    return counts


def matching_bits(sk_a: np.ndarray, sk_b: np.ndarray) -> np.ndarray:
    """Number of agreeing bits between sketch rows ``(..., ell)``."""
    sk_a = np.asarray(sk_a, dtype=np.uint64)
    sk_b = np.asarray(sk_b, dtype=np.uint64)
    nbits = sk_a.shape[-1] * 64
    diff = popcount(sk_a ^ sk_b).sum(axis=-1)
    return nbits - diff


def estimate_jaccard(sk_a: np.ndarray, sk_b: np.ndarray) -> np.ndarray:
    """Jaccard estimate ``2m - 1`` from 1-bit sketches (may be negative)."""
    sk_a = np.asarray(sk_a, dtype=np.uint64)
    nbits = sk_a.shape[-1] * 64
    return 2.0 * matching_bits(sk_a, sk_b) / nbits - 1.0


def sketch_threshold(lam: float, delta: float, nbits: int) -> float:
    """Estimated-similarity cutoff ``lambda_hat``.

    Chosen so that a pair with true ``J >= lam`` (bit-match probability
    ``p = (1+lam)/2``, ``nbits`` independent bits) falls below the cutoff
    with probability < ``delta`` (normal approximation to the binomial).
    ``delta >= 1`` disables the filter entirely (cutoff -1).
    """
    if not 0 < lam < 1:
        raise ValueError(f"lam must be in (0,1), got {lam}")
    if delta >= 1:
        return -1.0
    p = (1.0 + lam) / 2.0
    z = NormalDist().inv_cdf(1.0 - delta)
    m_cut = p - z * np.sqrt(p * (1.0 - p) / nbits)
    return max(-1.0, 2.0 * m_cut - 1.0)


def sketch_pass(
    sk_a: np.ndarray, sk_b: np.ndarray, lam: float, delta: float
) -> np.ndarray:
    """Boolean mask: which sketch pairs survive the similarity filter."""
    sk_a = np.asarray(sk_a, dtype=np.uint64)
    nbits = sk_a.shape[-1] * 64
    if nbits == 0:  # sketching disabled (ell = 0): everything survives
        return np.ones(sk_a.shape[:-1], dtype=bool)
    return estimate_jaccard(sk_a, sk_b) >= sketch_threshold(lam, delta, nbits)
