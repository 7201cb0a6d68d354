"""Distributed TLB (tightness of lower bound) evaluation — Tables V/VI.

TLB = mean over (query, series) pairs of ``LBD / true distance``
(Section V-E). The series side is partitioned in Spark; each partition
computes, for every candidate summarization, the vectorized LBD of all
queries against its series and emits partial (sum, count); a Spark
aggregation finishes the mean. One Spark action evaluates *all*
(method, alphabet) variants of one dataset.
"""
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.distance import ed2_batch
from repro.distrib.dataset import series_df
from repro.summaries.common import SymbolicSummary
from repro.summaries.sax import SAXSummary
from repro.summaries.sfa import SFASummary
from repro.summaries.simd import batch_mindist2

#: paper ablation variants (Table V/VI rows)
TLB_METHODS = ("SFA ED +VAR", "SFA EW +VAR", "iSAX")


def fit_variants(train: np.ndarray, alphabets, l: int = 16) -> dict[str, SymbolicSummary]:
    """Fit every (method, alphabet) summary on the training split.

    Keys are ``f"{method}|{alphabet}"``.
    """
    n = train.shape[1]
    out: dict[str, SymbolicSummary] = {}
    for a in alphabets:
        out[f"SFA ED +VAR|{a}"] = SFASummary.fit(train, l=l, alphabet=a,
                                                 binning="equi_depth")
        out[f"SFA EW +VAR|{a}"] = SFASummary.fit(train, l=l, alphabet=a,
                                                 binning="equi_width")
        out[f"iSAX|{a}"] = SAXSummary(n, l=l, alphabet=a)
    return out


def tlb_spark(spark: SparkSession, eval_x: np.ndarray, queries: np.ndarray,
              summaries: dict[str, SymbolicSummary],
              partitions: int = 8) -> dict[str, float]:
    """Mean TLB of each summary over all (query, series) pairs — one action."""
    queries = np.atleast_2d(np.asarray(queries, dtype=np.float64))
    df = series_df(spark, eval_x, num_partitions=partitions)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if not len(pdf):
                continue
            X = np.stack(pdf["series"].to_numpy())
            true = np.sqrt(ed2_batch(queries, X))  # (Q, N)
            mask = true > 1e-12
            labels, sums, cnts = [], [], []
            for label, s in summaries.items():
                words = s.words(X)
                qv = s.approx(queries)
                lbd2 = np.stack([
                    batch_mindist2(qv[i], words, s.edges, s.weights)
                    for i in range(len(queries))])
                ratio = np.sqrt(lbd2)[mask] / true[mask]
                labels.append(label)
                sums.append(float(np.clip(ratio, 0.0, 1.0).sum()))
                cnts.append(int(mask.sum()))
            yield pd.DataFrame({"label": labels, "s": sums, "c": cnts})

    agg = (df.mapInPandas(run, schema="label string, s double, c long")
           .groupBy("label").agg(F.sum("s").alias("s"), F.sum("c").alias("c"))
           .collect())
    return {r["label"]: (r["s"] / r["c"] if r["c"] else 1.0) for r in agg}
