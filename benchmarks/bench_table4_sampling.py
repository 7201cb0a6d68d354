"""Table IV benchmark: SOFA query latency vs MCB sampling rate.

Paper shape: times stabilize around the 1% default; smaller rates are
slightly worse (noisier bins), larger rates buy little.
"""
import pytest

from benchmarks.bench_common import warm_search_callable


@pytest.mark.parametrize("sampling", [0.001, 0.01, 0.2])
def test_sofa_sampling_rate(benchmark, spark, sampling):
    call = warm_search_callable(spark, dataset="SCEDC", method="SOFA",
                                partitions=16, k=1, n_queries=20,
                                sampling=sampling)
    benchmark.pedantic(call, rounds=3, iterations=1, warmup_rounds=1)
