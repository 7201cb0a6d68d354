"""Shared test utilities: data factories and a brute-force oracle."""
import numpy as np

from repro.core.distance import ed2_batch
from repro.core.znorm import znormalize


def znormed(n_series: int, length: int, seed: int = 0) -> np.ndarray:
    """Random z-normalized float32 series batch."""
    g = np.random.default_rng(seed)
    return znormalize(g.standard_normal((n_series, length)).astype(np.float32))


def brute_knn(X: np.ndarray, q: np.ndarray, k: int) -> list[tuple[float, int]]:
    """Ground-truth k-NN: (distance, id) ascending, ties broken by id."""
    d2 = ed2_batch(q[None, :], X)[0]
    order = np.lexsort((np.arange(len(X)), d2))[:k]
    return [(float(np.sqrt(d2[i])), int(i)) for i in order]
