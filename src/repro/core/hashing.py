"""Deterministic vectorized 64-bit hashing.

Every stochastic-looking component in this reproduction (MinHash slots,
feature hashing, pseudo-random slot embeddings) is derived from the hash
functions here, so results are bit-stable across processes and across
Spark executors (no reliance on ``PYTHONHASHSEED``).

Two layers:

* ``hash_strings`` — base 64-bit hash of arbitrary strings (FNV-1a over
  UTF-8 bytes, vectorized via numpy byte views).
* avalanche *finalizers* (``mix_murmur3``, ``mix_xx``, ``mix_splitmix``)
  — cheap uint64→uint64 bijections used to derive independent hash
  families from the base hash. The paper's technical report checks
  robustness across MMH3 / xxhash / etc.; these finalizers play that
  role here.
"""
from __future__ import annotations

import numpy as np

_FNV_OFFSET = np.uint64(0xCBF29CE484222325)
_FNV_PRIME = np.uint64(0x100000001B3)

# numpy intentionally warns on uint64 overflow in some paths; all
# arithmetic here is modulo-2^64 by design.
_err = {"over": "ignore"}


def hash_strings(values: "np.ndarray | list[str]") -> np.ndarray:
    """FNV-1a 64-bit hash of each string (uint64 array).

    Vectorized over the byte dimension: strings are padded into a
    (n, maxlen) byte matrix and folded column-by-column, masking
    positions past each string's length. O(n * maxlen) numpy ops.
    """
    arr = np.asarray(values, dtype=object)
    n = len(arr)
    if n == 0:
        return np.empty(0, dtype=np.uint64)
    encoded = [str(v).encode("utf-8", "surrogatepass") for v in arr]
    lens = np.fromiter((len(b) for b in encoded), dtype=np.int64, count=n)
    maxlen = int(lens.max()) if n else 0
    with np.errstate(**_err):
        h = np.full(n, _FNV_OFFSET, dtype=np.uint64)
        if maxlen == 0:
            return h
        mat = np.zeros((n, maxlen), dtype=np.uint8)
        for i, b in enumerate(encoded):
            if b:
                mat[i, : len(b)] = np.frombuffer(b, dtype=np.uint8)
        for j in range(maxlen):
            active = lens > j
            hj = h[active]
            hj = (hj ^ mat[active, j].astype(np.uint64)) * _FNV_PRIME
            h[active] = hj
    return h


def mix_murmur3(h: np.ndarray) -> np.ndarray:
    """MurmurHash3 fmix64 finalizer (full avalanche)."""
    h = h.astype(np.uint64, copy=True)
    with np.errstate(**_err):
        h ^= h >> np.uint64(33)
        h *= np.uint64(0xFF51AFD7ED558CCD)
        h ^= h >> np.uint64(33)
        h *= np.uint64(0xC4CEB9FE1A85EC53)
        h ^= h >> np.uint64(33)
    return h


def mix_xx(h: np.ndarray) -> np.ndarray:
    """xxHash64-style avalanche finalizer."""
    h = h.astype(np.uint64, copy=True)
    with np.errstate(**_err):
        h ^= h >> np.uint64(33)
        h *= np.uint64(0xC2B2AE3D27D4EB4F)
        h ^= h >> np.uint64(29)
        h *= np.uint64(0x165667B19E3779F9)
        h ^= h >> np.uint64(32)
    return h


def mix_splitmix(h: np.ndarray) -> np.ndarray:
    """SplitMix64 finalizer."""
    h = h.astype(np.uint64, copy=True)
    with np.errstate(**_err):
        h += np.uint64(0x9E3779B97F4A7C15)
        h = (h ^ (h >> np.uint64(30))) * np.uint64(0xBF58476D1CE4E5B9)
        h = (h ^ (h >> np.uint64(27))) * np.uint64(0x94D049BB133111EB)
        h ^= h >> np.uint64(31)
    return h


MIXERS = {"murmur3": mix_murmur3, "xx": mix_xx, "splitmix": mix_splitmix}


def hash_with_seed(base: np.ndarray, seed: int, family: str = "murmur3") -> np.ndarray:
    """Derive an independent hash from a base hash and an integer seed."""
    mixer = MIXERS[family]
    with np.errstate(**_err):
        return mixer(base.astype(np.uint64) ^ mix_splitmix(np.uint64(seed) + np.zeros(1, np.uint64))[0])


def signed_unit_components(h: np.ndarray, dim: int, seed: int = 0) -> np.ndarray:
    """Map each uint64 hash to a pseudo-random ±1/sqrt(dim) vector.

    Same hash → same vector; distinct hashes → near-orthogonal vectors in
    expectation. Used to embed MinHash slot values so that the expected
    dot product of two slot embeddings equals the slot-match rate (a
    Jaccard estimate) — the geometric property the search stack relies on.
    Returns (len(h), dim) float32.
    """
    h = np.asarray(h, dtype=np.uint64)
    consts = mix_splitmix(np.arange(seed * 1000, seed * 1000 + dim, dtype=np.uint64))
    with np.errstate(**_err):
        mixed = mix_murmur3(h[:, None] ^ consts[None, :])
    signs = np.where((mixed >> np.uint64(63)).astype(bool), 1.0, -1.0)
    return (signs / np.sqrt(dim)).astype(np.float32)
