"""Evaluation metrics from the paper's ablation study (Section V-E).

- Tightness of Lower Bound (TLB): ``LBD / true distance`` averaged over
  query x data pairs (Keogh et al.). Higher is better; 1.0 means the
  summarization loses nothing for pruning purposes.
- Pruning power: fraction of data series whose LBD to the query already
  exceeds the true 1-NN distance, i.e. series GEMINI never has to touch.
"""
import numpy as np


def tlb(lbd: np.ndarray, true_dist: np.ndarray) -> float:
    """Mean LBD/true-distance ratio over pairs; zero-distance pairs are skipped.

    Both inputs are *distances* (not squared). Raises if any ratio exceeds
    1 + 1e-6, because that would mean the "lower bound" is not one.
    """
    lbd = np.asarray(lbd, dtype=np.float64).ravel()
    td = np.asarray(true_dist, dtype=np.float64).ravel()
    mask = td > 1e-12
    if not mask.any():
        return 1.0
    ratio = lbd[mask] / td[mask]
    if ratio.max() > 1.0 + 1e-6:
        raise ValueError(f"LBD exceeds true distance (max ratio {ratio.max():.6f})")
    return float(np.clip(ratio, 0.0, 1.0).mean())


def pruning_power(lbd2: np.ndarray, nn_dist2: float) -> float:
    """Fraction of series pruned by their squared LBD against the true
    squared 1-NN distance (the best possible BSF)."""
    lbd2 = np.asarray(lbd2, dtype=np.float64).ravel()
    if lbd2.size == 0:
        return 0.0
    return float((lbd2 > nn_dist2).mean())
