"""MinHash signatures (§3.2 of the paper) in pure numpy.

The paper uses the ``datasketch`` library; that is not available offline,
so this module reimplements the standard single-hash + k-rehash MinHash:
each element gets a base 64-bit hash, and slot ``i`` of the signature is
``min over elements of mix(base ^ seed_i)``. Collision probability of a
slot between two sets equals their Jaccard similarity, so the fraction
of matching slots is an unbiased Jaccard estimator.

Signatures are uint64 arrays of length ``num_perm`` (default 64).
``EMPTY_SLOT = 0`` marks the signature of an empty set / absent sketch
(a natural hash of 0 is vanishingly unlikely); estimators treat
empty-against-anything as similarity 0.
"""
from __future__ import annotations

import numpy as np

from .hashing import MIXERS, hash_strings, mix_splitmix

DEFAULT_NUM_PERM = 64
EMPTY_SLOT = np.uint64(0)


def _slot_seeds(num_perm: int) -> np.ndarray:
    return mix_splitmix(np.arange(1, num_perm + 1, dtype=np.uint64))


def minhash_signature(
    elements: "np.ndarray | list[str]",
    num_perm: int = DEFAULT_NUM_PERM,
    family: str = "murmur3",
) -> np.ndarray:
    """Signature of the *set* of ``elements`` (duplicates are harmless).

    Returns uint64[num_perm]; all-EMPTY_SLOT for an empty input.
    """
    base = hash_strings(elements)
    return minhash_from_hashes(base, num_perm=num_perm, family=family)


def minhash_from_hashes(
    base: np.ndarray, num_perm: int = DEFAULT_NUM_PERM, family: str = "murmur3"
) -> np.ndarray:
    """Signature from precomputed base hashes (uint64[n])."""
    if len(base) == 0:
        return np.full(num_perm, EMPTY_SLOT, dtype=np.uint64)
    mixer = MIXERS[family]
    seeds = _slot_seeds(num_perm)
    with np.errstate(over="ignore"):
        # (n, num_perm) rehash, then column-min. Avoid 0 (the empty
        # sentinel) by mapping any real 0 to 1.
        table = mixer(base.astype(np.uint64)[:, None] ^ seeds[None, :])
    table[table == EMPTY_SLOT] = np.uint64(1)
    return table.min(axis=0)


def is_empty(sig: np.ndarray) -> bool:
    return bool(np.all(np.asarray(sig, dtype=np.uint64) == EMPTY_SLOT))


def jaccard_estimate(a: np.ndarray, b: np.ndarray) -> float:
    """Fraction of matching slots ≈ Jaccard(A, B); 0 if either empty."""
    a = np.asarray(a, dtype=np.uint64)
    b = np.asarray(b, dtype=np.uint64)
    if is_empty(a) or is_empty(b):
        return 0.0
    return float(np.mean(a == b))


def containment_estimate(a: np.ndarray, b: np.ndarray, size_a: int, size_b: int) -> float:
    """Estimate |A∩B| / |A| from signatures + true set sizes.

    Uses the inclusion–exclusion identity |A∩B| = J·(|A|+|B|)/(1+J)
    with the Jaccard estimate J, clipped to [0, 1].
    """
    if size_a <= 0:
        return 0.0
    j = jaccard_estimate(a, b)
    inter = j * (size_a + size_b) / (1.0 + j) if j < 1.0 else float(min(size_a, size_b))
    return float(np.clip(inter / size_a, 0.0, 1.0))


def merge_signatures(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Signature of the union of the underlying sets (slotwise min)."""
    a = np.asarray(a, dtype=np.uint64)
    b = np.asarray(b, dtype=np.uint64)
    if is_empty(a):
        return b.copy()
    if is_empty(b):
        return a.copy()
    return np.minimum(a, b)
