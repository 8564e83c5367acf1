"""MinHash embeddings and 1-bit minwise sketches (paper §II-A, §V-A1/2).

The paper maps every set ``x`` to ``t`` MinHash values so that the
Braun-Blanquet similarity of the embedded coordinate sets estimates the
Jaccard similarity of the originals: a single coordinate of two sets
collides with probability exactly ``J(x, y)``.  On top of the embedding
it builds 1-bit minwise sketches (Li & Koenig) of ``64 * ell`` bits for
cheap similarity estimation.

Substitution vs. the paper (documented in DESIGN.md §4): the paper uses
Zobrist (tabulation) hashing and stores the arg-min *token*; we use
multiply-add universal hashing on 64-bit words with wraparound and store
the *minimum hash value*.  Both preserve the collision property
``Pr[mh_i(x) = mh_i(y)] ~= J(x, y)`` that every downstream component
consumes, which the tests validate empirically.
"""
from __future__ import annotations

import numpy as np

__all__ = ["MinHasher", "pack_bits"]


def pack_bits(bits: np.ndarray) -> np.ndarray:
    """Pack a ``(..., 64*ell)`` 0/1 array into ``(..., ell)`` uint64 words."""
    if bits.shape[-1] % 64 != 0:
        raise ValueError(f"bit count {bits.shape[-1]} not a multiple of 64")
    packed = np.packbits(bits.astype(np.uint8), axis=-1, bitorder="little")
    return packed.view(np.uint64).reshape(*bits.shape[:-1], bits.shape[-1] // 64)


class MinHasher:
    """A fixed family of ``t + 64*ell`` MinHash functions.

    The first ``t`` minima form the Chosen-Path embedding; the remaining
    ``64*ell`` minima are folded to one bit each (via an independent
    1-bit hash of the minimum) and packed into the ``ell``-word sketch.
    Deterministic in ``seed`` so Spark workers and the driver agree.
    """

    def __init__(self, t: int = 128, ell: int = 8, seed: int = 0):
        if t < 1 or ell < 0:
            raise ValueError(f"need t >= 1 (got {t}) and ell >= 0 (got {ell})")
        self.t = t
        self.ell = ell
        self.n_funcs = t + 64 * ell
        rng = np.random.default_rng(seed)
        # Random odd multipliers + offsets: multiply-add mod 2^64.
        self._a = (
            rng.integers(0, np.iinfo(np.int64).max, self.n_funcs).astype(np.uint64)
            << np.uint64(1)
        ) | np.uint64(1)
        self._b = rng.integers(0, np.iinfo(np.int64).max, self.n_funcs).astype(
            np.uint64
        )
        # Independent odd multipliers for the 1-bit fold g_i(minvalue).
        self._c = (
            rng.integers(0, np.iinfo(np.int64).max, max(1, 64 * ell)).astype(np.uint64)
            << np.uint64(1)
        ) | np.uint64(1)

    def _hash_tokens(self, tokens: np.ndarray) -> np.ndarray:
        """``(s,)`` token ids -> ``(s, n_funcs)`` uint64 hash matrix."""
        toks = np.asarray(tokens, dtype=np.uint64)
        with np.errstate(over="ignore"):
            return toks[:, None] * self._a[None, :] + self._b[None, :]

    def embed_one(self, tokens: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """Embed one set: returns ``(mh int64 (t,), sketch uint64 (ell,))``."""
        mh, sk = self.embed_many([tokens])
        return mh[0], sk[0]

    def embed_many(self, token_sets) -> tuple[np.ndarray, np.ndarray]:
        """Embed a batch of sets.

        ``token_sets`` is a sequence of integer arrays (each a set's
        tokens). Returns ``(mh, sketch)`` with ``mh`` int64 of shape
        ``(n, t)`` and ``sketch`` uint64 of shape ``(n, ell)``.

        The hash matrix is computed once per *unique* token in the batch
        and re-read per set, so the cost is ``O(d * n_funcs + sum|x|)``
        memory-wise with a cheap per-set min reduction.
        """
        n = len(token_sets)
        mh = np.empty((n, self.t), dtype=np.int64)
        sketch = np.empty((n, self.ell), dtype=np.uint64)
        if n == 0:
            return mh, sketch
        flat = np.concatenate([np.asarray(x, dtype=np.uint64) for x in token_sets])
        uniq, inv = np.unique(flat, return_inverse=True)
        hmat = self._hash_tokens(uniq)  # (d, n_funcs)
        off = 0
        nbits = 64 * self.ell
        for i, x in enumerate(token_sets):
            s = len(x)
            if s == 0:
                raise ValueError(f"empty set at index {i}")
            rows = hmat[inv[off : off + s]]
            minima = rows.min(axis=0)  # (n_funcs,) uint64
            mh[i] = minima[: self.t].view(np.int64)
            if self.ell:
                with np.errstate(over="ignore"):
                    folded = minima[self.t :] * self._c
                bits = (folded >> np.uint64(63)).astype(np.uint8)
                sketch[i] = pack_bits(bits)
            off += s
        return mh, sketch
