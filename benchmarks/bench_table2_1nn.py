"""Table II benchmark: exact 1-NN query-batch latency per method.

Covers one high-frequency dataset (LenDB — the paper's largest SOFA win),
one low-frequency (Astro) and one vector dataset (SIFT1b), at 16
partitions (the paper's 36-core column). Expected ordering per the
paper: SOFA <= MESSI on every dataset, with a large gap on LenDB;
the UCR suite slowest among per-query methods. See EXPERIMENTS.md for
the FAISS small-N caveat.
"""
import pytest

from benchmarks.bench_common import warm_search_callable

DATASETS = ["LenDB", "Astro", "SIFT1b"]
METHODS = ["UCR suite", "FAISS", "MESSI", "SOFA"]


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("method", METHODS)
def test_1nn_query_batch(benchmark, spark, dataset, method):
    call = warm_search_callable(spark, dataset=dataset, method=method,
                                partitions=16, k=1, n_queries=20)
    benchmark.pedantic(call, rounds=3, iterations=1, warmup_rounds=1)
