"""Piecewise Aggregate Approximation (PAA), Keogh et al. 2001.

Supports series lengths not divisible by the segment count via
``np.array_split``-style near-equal segments; the lower bound then uses
per-segment lengths as weights:

    ed2(A, B) >= sum_j len_j * (paa(A)_j - paa(B)_j)^2

which holds per segment by the Cauchy-Schwarz inequality.
"""
import numpy as np


def segment_bounds(n: int, l: int) -> np.ndarray:
    """Boundaries of ``l`` near-equal segments of ``range(n)`` — length l+1."""
    if not 1 <= l <= n:
        raise ValueError(f"need 1 <= l <= n, got l={l}, n={n}")
    return np.linspace(0, n, l + 1).round().astype(np.int64)


def segment_lengths(n: int, l: int) -> np.ndarray:
    """Length of each PAA segment, the weights of the PAA lower bound."""
    return np.diff(segment_bounds(n, l)).astype(np.float64)


def paa(x: np.ndarray, l: int) -> np.ndarray:
    """PAA of a batch ``(N, n)`` (or a single series) -> ``(N, l)`` float64."""
    x = np.atleast_2d(np.asarray(x, dtype=np.float64))
    n = x.shape[1]
    b = segment_bounds(n, l)
    csum = np.concatenate([np.zeros((x.shape[0], 1)), np.cumsum(x, axis=1)], axis=1)
    seg_sums = csum[:, b[1:]] - csum[:, b[:-1]]
    return seg_sums / np.diff(b)[None, :]


def paa_lb2(pa: np.ndarray, pb: np.ndarray, n: int) -> np.ndarray:
    """Squared PAA lower bound between PAA rows ``pa`` and ``pb`` (same l)."""
    pa = np.atleast_2d(pa)
    pb = np.atleast_2d(pb)
    w = segment_lengths(n, pa.shape[1])
    return np.einsum("ij,j->i", (pa - pb) ** 2, w)
