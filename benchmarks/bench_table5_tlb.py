"""Table V benchmark: distributed TLB evaluation on UCR-like datasets.

Measures the full Spark TLB pass (all three methods, one alphabet) per
dataset — the cost of the ablation harness itself.
"""
import pytest

from repro.datasets.registry import ucr_like
from repro.experiments.tlb import fit_variants, tlb_spark

SUITE = {name: (train, test)
         for name, train, test in ucr_like(n_train=200, n_test=20)}


@pytest.mark.parametrize("dataset", ["u_walk", "u_seis_hi", "u_square"])
def test_tlb_pass(benchmark, spark, dataset):
    train, test = SUITE[dataset]
    variants = fit_variants(train, (256,))
    benchmark.pedantic(
        lambda: tlb_spark(spark, train, test, variants, partitions=8),
        rounds=3, iterations=1, warmup_rounds=1)
