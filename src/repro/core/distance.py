"""Euclidean distance kernels.

Three tiers, mirroring the paper's engines:

- ``ed2`` / ``ed``: scalar reference (tests, small paths).
- ``ed2_early_abandon``: UCR-style early-abandoning squared ED — stop as
  soon as the running sum exceeds the best-so-far (BSF). Used by the
  tree's survivor verification and the UCR-Suite-P baseline.
- ``ed2_batch``: exact batch squared ED via the GEMM identity
  ``||a-b||^2 = ||a||^2 + ||b||^2 - 2 a.b`` — the FAISS IndexFlatL2
  analog, and the fast path when a whole leaf survives LBD filtering.
"""
import numpy as np


def ed2(a: np.ndarray, b: np.ndarray) -> float:
    """Squared Euclidean distance between two series of equal length."""
    d = np.asarray(a, dtype=np.float64) - np.asarray(b, dtype=np.float64)
    return float(np.dot(d, d))


def ed(a: np.ndarray, b: np.ndarray) -> float:
    """Euclidean distance between two series of equal length."""
    return float(np.sqrt(ed2(a, b)))


def ed2_early_abandon(a: np.ndarray, b: np.ndarray, bsf2: float, chunk: int = 32) -> float:
    """Squared ED with early abandoning against a squared BSF.

    Accumulates in ``chunk``-sized blocks (the SIMD-register-width analog
    of Algorithm 3's chunking) and returns the partial sum as soon as it
    exceeds ``bsf2``. A returned value ``> bsf2`` therefore only certifies
    "worse than BSF", not the exact distance.
    """
    a = np.asarray(a, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    total = 0.0
    for i in range(0, len(a), chunk):
        d = a[i : i + chunk] - b[i : i + chunk]
        total += float(np.dot(d, d))
        if total > bsf2:
            return total
    return total


def ed2_batch(queries: np.ndarray, data: np.ndarray) -> np.ndarray:
    """Exact squared ED between every query and every data series.

    ``queries`` is (Q, n), ``data`` is (N, n); returns (Q, N) float64.
    Uses the GEMM identity; negative round-off is clipped to 0 so callers
    can take square roots safely.
    """
    q = np.atleast_2d(np.asarray(queries, dtype=np.float64))
    x = np.atleast_2d(np.asarray(data, dtype=np.float64))
    qq = np.einsum("ij,ij->i", q, q)[:, None]
    xx = np.einsum("ij,ij->i", x, x)[None, :]
    d2 = qq + xx - 2.0 * (q @ x.T)
    np.maximum(d2, 0.0, out=d2)
    return d2
