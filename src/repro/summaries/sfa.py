"""SFA — the learned symbolic representation (paper Sections IV-E/IV-F).

``SFASummary.fit`` is Algorithm 1 (MCB): sample the collection, DFT it,
rank scalar Fourier components (real/imag separately) by variance within
the first ``n_candidate_coeffs`` complex coefficients, keep the top
``l``, and learn per-component quantization edges by equi-width
(default, the paper's best variant) or equi-depth binning of the sample
distribution. ``approx``/``words`` implement Algorithm 2 for batches.

The DC component (k=0) is excluded: for z-normalized series it is
identically 0 and the paper omits it from the bound. The squared lower
bound is ``sum_j weights_j * mindist_j^2 <= ed2`` with weights from
``repro.summaries.dft.component_space`` (2, or 1 at the Nyquist real).
"""
import numpy as np

from repro.summaries.common import SymbolicSummary
from repro.summaries.dft import ComponentSpace, component_space, dft_components

BINNINGS = ("equi_width", "equi_depth")
SELECTIONS = ("variance", "first")


def _learn_edges(col: np.ndarray, alphabet: int, binning: str) -> np.ndarray:
    """Interior edges (alphabet-1,) for one component's sample values."""
    if binning == "equi_width":
        lo, hi = float(col.min()), float(col.max())
        if hi - lo < 1e-12:  # degenerate component: all mass in one bin
            hi = lo + 1e-12
        return np.linspace(lo, hi, alphabet + 1)[1:-1]
    if binning == "equi_depth":
        return np.quantile(col, np.arange(1, alphabet) / alphabet)
    raise ValueError(f"binning must be one of {BINNINGS}, got {binning!r}")


class SFASummary(SymbolicSummary):
    """SFA summary over a fixed component selection and learned bins."""

    def __init__(self, n: int, sel: np.ndarray, space: ComponentSpace,
                 edges: np.ndarray, alphabet: int):
        self.n = int(n)
        self.space = space
        self.sel = np.asarray(sel, dtype=np.int64)  # indices into space components
        super().__init__(l=len(self.sel), alphabet=alphabet, edges=edges,
                         weights=space.weights[self.sel])

    # -- Algorithm 1: MCB --------------------------------------------------
    @classmethod
    def fit(cls, sample: np.ndarray, l: int = 16, alphabet: int = 256,
            binning: str = "equi_width", selection: str = "variance",
            n_candidate_coeffs: int = 16) -> "SFASummary":
        """Learn selection + bins from a (z-normalized) sample ``(N, n)``.

        ``n_candidate_coeffs`` restricts candidates to the first that many
        complex coefficients (paper setup: 16, i.e. 32 scalar values);
        DC is always excluded.
        """
        if selection not in SELECTIONS:
            raise ValueError(f"selection must be one of {SELECTIONS}, got {selection!r}")
        sample = np.atleast_2d(np.asarray(sample, dtype=np.float64))
        n = sample.shape[1]
        space = component_space(n)
        comps = dft_components(sample, space)  # (N, m)
        cand = np.array([i for i, (k, _) in enumerate(space.labels)
                         if 1 <= k <= n_candidate_coeffs], dtype=np.int64)
        if len(cand) < l:
            raise ValueError(f"only {len(cand)} candidate components for l={l}; "
                             f"raise n_candidate_coeffs or shorten the word")
        if selection == "variance":
            var = comps[:, cand].var(axis=0)
            # descending variance; stable tie-break on component order so the
            # fit is deterministic across platforms
            order = np.lexsort((cand, -var))
            sel = cand[order][:l]
        else:  # "first": low-pass behaviour of the original SFA paper
            sel = cand[:l]
        interior = np.stack([_learn_edges(comps[:, s], alphabet, binning) for s in sel])
        edges = np.concatenate(
            [np.full((l, 1), -np.inf), interior, np.full((l, 1), np.inf)], axis=1)
        return cls(n=n, sel=sel, space=space, edges=edges, alphabet=alphabet)

    # -- Algorithm 2: transform ---------------------------------------------
    def approx(self, x: np.ndarray) -> np.ndarray:
        x = np.atleast_2d(np.asarray(x, dtype=np.float64))
        if x.shape[1] != self.n:
            raise ValueError(f"series length {x.shape[1]} != {self.n}")
        return dft_components(x, self.space)[:, self.sel]

    @property
    def mean_selected_coeff_index(self) -> float:
        """Mean scalar component index of the selection (paper Fig. 13's
        x-axis): high values mean SFA kept high-frequency information."""
        return float(np.mean(self.sel))
