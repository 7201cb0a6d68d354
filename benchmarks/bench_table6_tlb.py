"""Table VI benchmark: distributed TLB evaluation on SOFA dataset analogs."""
import pytest

from repro.datasets.registry import make_dataset, make_queries
from repro.experiments.tlb import fit_variants, tlb_spark


@pytest.mark.parametrize("dataset", ["LenDB", "SALD"])
def test_tlb_pass(benchmark, spark, dataset):
    x = make_dataset(dataset, scale=0.5)
    q = make_queries(dataset, 20, scale=0.5)
    variants = fit_variants(x[:1000], (256,))
    benchmark.pedantic(
        lambda: tlb_spark(spark, x[:1500], q, variants, partitions=8),
        rounds=3, iterations=1, warmup_rounds=1)
