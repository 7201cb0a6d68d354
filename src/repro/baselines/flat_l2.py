"""FAISS IndexFlatL2 analog: exact batched brute force under L2.

FAISS's flat index answers query batches with a BLAS GEMM over the
``||a-b||^2 = ||a||^2 + ||b||^2 - 2 a.b`` identity plus a top-k
selection — no summarization, no pruning. The paper runs it with query
mini-batches sized to the core count; here the whole query batch hits
each partition at once and NumPy's BLAS plays MKL's role.
"""
import numpy as np

from repro.core.distance import ed2_batch


def flat_knn(X: np.ndarray, queries: np.ndarray, k: int = 1,
             ids: np.ndarray | None = None) -> list[list[tuple[float, int]]]:
    """Exact k-NN via one GEMM; same return shape as ``ucr_knn``."""
    X = np.atleast_2d(X)
    queries = np.atleast_2d(queries)
    ids = np.arange(len(X), dtype=np.int64) if ids is None else np.asarray(ids)
    kk = min(k, len(X))
    d2 = ed2_batch(queries, X)  # (Q, N)
    out = []
    for qi in range(d2.shape[0]):
        part = np.argpartition(d2[qi], kk - 1)[:kk]
        pairs = sorted((float(np.sqrt(d2[qi, p])), int(ids[p])) for p in part)
        out.append(pairs)
    return out
