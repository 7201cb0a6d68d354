"""Table III benchmark: k-NN scalability at 16 partitions (36-core column).

Paper shape: all methods grow mildly with k; SOFA stays fastest.
"""
import pytest

from benchmarks.bench_common import warm_search_callable


@pytest.mark.parametrize("k", [1, 10, 50])
@pytest.mark.parametrize("method", ["FAISS", "MESSI", "SOFA"])
def test_knn_query_batch(benchmark, spark, method, k):
    call = warm_search_callable(spark, dataset="LenDB", method=method,
                                partitions=16, k=k, n_queries=20)
    benchmark.pedantic(call, rounds=3, iterations=1, warmup_rounds=1)
