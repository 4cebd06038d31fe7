"""Deterministic vectorized hashing for the LSH schemes.

All LSH randomness in the repo derives from splitmix64 finalization of
(seed, vertex id, sample index) tuples, so sketches are reproducible
across engines and — crucially — both endpoints of an edge see the same
random projection / permutation for a given universe element. Gaussians
come from the Box–Muller transform over two hash-derived uniforms,
exactly the construction the paper cites (§5).
"""
from __future__ import annotations

import numpy as np

_M = np.uint64(0xFFFFFFFFFFFFFFFF)
_C1 = np.uint64(0xBF58476D1CE4E5B9)
_C2 = np.uint64(0x94D049BB133111EB)
_GOLDEN = np.uint64(0x9E3779B97F4A7C15)


def splitmix64(x: np.ndarray) -> np.ndarray:
    """splitmix64 finalizer over a uint64 array (vectorized, wraps)."""
    with np.errstate(over="ignore"):
        x = (x + _GOLDEN).astype(np.uint64)
        x = ((x ^ (x >> np.uint64(30))) * _C1).astype(np.uint64)
        x = ((x ^ (x >> np.uint64(27))) * _C2).astype(np.uint64)
        return (x ^ (x >> np.uint64(31))).astype(np.uint64)


def hash_tuple(seed: int, a: np.ndarray, b: np.ndarray | int = 0, salt: int = 0) -> np.ndarray:
    """64-bit hash of (seed, a, b, salt); a/b broadcast as uint64."""
    a = np.asarray(a, dtype=np.uint64)
    b = np.asarray(b, dtype=np.uint64)
    with np.errstate(over="ignore"):
        x = splitmix64(np.uint64(seed) ^ splitmix64(a))
        x = splitmix64(x ^ splitmix64(b + np.uint64(0x1234567)))
        if salt:
            x = splitmix64(x ^ np.uint64(salt))
    return x


def uniform01(h: np.ndarray) -> np.ndarray:
    """uint64 hash → uniform in (0, 1] (never 0, safe for log)."""
    return (h.astype(np.float64) + 1.0) / 18446744073709551616.0  # 2**64


def gaussians(seed: int, x: np.ndarray, k: int) -> np.ndarray:
    """Deterministic N(0,1) matrix of shape (len(x), k).

    Entry (i, j) depends only on (seed, x[i], j): the SimHash random
    hyperplane coordinate for universe element x[i] in sample j, via
    Box–Muller over two hash-derived uniforms.
    """
    x = np.asarray(x, dtype=np.uint64)
    j = np.arange(k, dtype=np.uint64)
    u1 = uniform01(hash_tuple(seed, x[:, None], j[None, :], salt=0x51))
    u2 = uniform01(hash_tuple(seed, x[:, None], j[None, :], salt=0x52))
    return np.sqrt(-2.0 * np.log(u1)) * np.cos(2.0 * np.pi * u2)
