"""Independent naive reference implementations of the distance measures.

Deliberately written in the most literal recursive/loop style (memoized
where needed) so bugs in the optimized kernels in ``measures.py`` cannot
be replicated here. Used only by tests and the DuckDB-assisted oracles.
"""
from __future__ import annotations

import math
from functools import lru_cache

import numpy as np


def _d(p, q) -> float:
    return math.hypot(p[0] - q[0], p[1] - q[1])


def hausdorff_ref(a: np.ndarray, b: np.ndarray) -> float:
    a = [tuple(p) for p in a]
    b = [tuple(p) for p in b]
    d1 = max(min(_d(p, q) for q in b) for p in a)
    d2 = max(min(_d(p, q) for q in a) for p in b)
    return max(d1, d2)


def frechet_ref(a: np.ndarray, b: np.ndarray) -> float:
    """Literal transcription of paper Eq. 6 (memoized recursion)."""
    a = tuple(tuple(p) for p in a)
    b = tuple(tuple(p) for p in b)

    @lru_cache(maxsize=None)
    def rec(m: int, n: int) -> float:
        if m == 1:
            return max(_d(a[0], b[j]) for j in range(n))
        if n == 1:
            return max(_d(a[i], b[0]) for i in range(m))
        return max(
            _d(a[m - 1], b[n - 1]),
            min(rec(m - 1, n - 1), rec(m - 1, n), rec(m, n - 1)),
        )

    return rec(len(a), len(b))


def dtw_ref(a: np.ndarray, b: np.ndarray) -> float:
    """Literal transcription of paper Eq. 12 (memoized recursion)."""
    a = tuple(tuple(p) for p in a)
    b = tuple(tuple(p) for p in b)

    @lru_cache(maxsize=None)
    def rec(m: int, n: int) -> float:
        if m == 1:
            return sum(_d(a[0], b[j]) for j in range(n))
        if n == 1:
            return sum(_d(a[i], b[0]) for i in range(m))
        return _d(a[m - 1], b[n - 1]) + min(
            rec(m - 1, n - 1), rec(m - 1, n), rec(m, n - 1)
        )

    return rec(len(a), len(b))


def erp_ref(a, b, gap=(0.0, 0.0)) -> float:
    a = tuple(tuple(p) for p in a)
    b = tuple(tuple(p) for p in b)

    @lru_cache(maxsize=None)
    def rec(m: int, n: int) -> float:
        if m == 0:
            return sum(_d(b[j], gap) for j in range(n))
        if n == 0:
            return sum(_d(a[i], gap) for i in range(m))
        return min(
            rec(m - 1, n - 1) + _d(a[m - 1], b[n - 1]),
            rec(m - 1, n) + _d(a[m - 1], gap),
            rec(m, n - 1) + _d(b[n - 1], gap),
        )

    return rec(len(a), len(b))


def edr_ref(a, b, eps: float) -> float:
    a = tuple(tuple(p) for p in a)
    b = tuple(tuple(p) for p in b)

    @lru_cache(maxsize=None)
    def rec(m: int, n: int) -> int:
        if m == 0:
            return n
        if n == 0:
            return m
        sub = 0 if _d(a[m - 1], b[n - 1]) <= eps else 1
        return min(rec(m - 1, n - 1) + sub, rec(m - 1, n) + 1, rec(m, n - 1) + 1)

    return float(rec(len(a), len(b)))


def lcss_len_ref(a, b, eps: float) -> int:
    a = tuple(tuple(p) for p in a)
    b = tuple(tuple(p) for p in b)

    @lru_cache(maxsize=None)
    def rec(m: int, n: int) -> int:
        if m == 0 or n == 0:
            return 0
        if _d(a[m - 1], b[n - 1]) <= eps:
            return rec(m - 1, n - 1) + 1
        return max(rec(m - 1, n), rec(m, n - 1))

    return rec(len(a), len(b))


def lcss_ref(a, b, eps: float) -> float:
    return 1.0 - lcss_len_ref(a, b, eps) / min(len(a), len(b))
