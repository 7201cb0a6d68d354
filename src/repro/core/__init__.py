"""Core numeric kernels shared by summarizations, indexes, and baselines.

Everything operates on float32/float64 NumPy matrices of shape (N, n):
N series of length n. All similarity-search code in this repo assumes
series have been z-normalized up front (``znorm.znormalize``), after
which the paper's z-normalized Euclidean distance reduces to plain ED.
"""
from repro.core.znorm import znormalize
from repro.core.distance import ed, ed2, ed2_batch, ed2_early_abandon

__all__ = ["znormalize", "ed", "ed2", "ed2_batch", "ed2_early_abandon"]
