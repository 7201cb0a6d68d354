"""Spark layer: the paper's multi-core parallelism mapped to partitions.

MESSI/SOFA parallelize one in-memory index across threads; here each
Spark partition owns an independent per-partition engine (SOFA/MESSI
tree, UCR scan, or flat GEMM scan) built inside the executor, and exact
global k-NN = per-partition exact top-k + a Spark SQL window merge.
MCB's 1 % sampling step runs as ``DataFrame.sample`` (``mcb``), and the
GEMINI lower-bound filter is also exposed as a pure DataFrame plan with
pandas UDFs (``transform``) so the DuckDB oracle can check it.
"""
from repro.distrib.dataset import series_df, to_matrix
from repro.distrib.mcb import fit_sfa_spark
from repro.distrib.search import exact_knn
from repro.distrib.transform import with_words, gemini_knn_sql

__all__ = ["series_df", "to_matrix", "fit_sfa_spark", "exact_knn",
           "with_words", "gemini_knn_sql"]
