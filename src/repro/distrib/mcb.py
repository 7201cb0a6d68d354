"""MCB (Algorithm 1) as a Spark job: sample -> collect -> fit -> broadcast.

The paper learns SFA's quantization from a 1 % sample of the collection
(Section IV-G, Table IV sweeps the rate). Here ``DataFrame.sample``
draws the subsample distributedly, the tiny sample is collected to the
driver, fitted with ``SFASummary.fit``, and the resulting summary
object (a few KiB of edges) rides to executors in task closures.
"""
import numpy as np
from pyspark.sql import DataFrame

from repro.distrib.dataset import to_matrix
from repro.summaries.sfa import SFASummary

_MIN_SAMPLE = 64  # below this, bin edges get too noisy to be meaningful


def fit_sfa_spark(df: DataFrame, *, fraction: float = 0.01, l: int = 16,
                  alphabet: int = 256, binning: str = "equi_width",
                  selection: str = "variance", n_candidate_coeffs: int = 16,
                  seed: int = 0) -> SFASummary:
    """Learn an SFA summary from a ``fraction`` sample of a series DataFrame."""
    sample = df.sample(fraction=min(1.0, fraction), seed=seed).toPandas()
    if len(sample) < _MIN_SAMPLE:
        sample = df.limit(_MIN_SAMPLE).toPandas()
    _, X = to_matrix(sample)
    return SFASummary.fit(np.asarray(X, dtype=np.float64), l=l, alphabet=alphabet,
                          binning=binning, selection=selection,
                          n_candidate_coeffs=n_candidate_coeffs)
