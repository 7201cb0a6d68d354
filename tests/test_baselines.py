"""Tests for the UCR-scan and flat-L2 baseline engines."""
import numpy as np
import pytest

from repro.baselines import flat_knn, ucr_knn
from tests.helpers import brute_knn, znormed


@pytest.mark.parametrize("engine", [ucr_knn, flat_knn])
@pytest.mark.parametrize("k", [1, 3, 10])
@pytest.mark.parametrize("seed", range(4))
def test_exact_vs_brute_force(engine, k, seed):
    X = znormed(150, 64, seed=seed)
    Q = znormed(5, 64, seed=seed + 50)
    res = engine(X, Q, k=k)
    for qi, q in enumerate(Q):
        exp = brute_knn(X, q, k)
        assert [i for _, i in res[qi]] == [i for _, i in exp]
        np.testing.assert_allclose([d for d, _ in res[qi]],
                                   [d for d, _ in exp], atol=1e-6)


@pytest.mark.parametrize("engine", [ucr_knn, flat_knn])
def test_custom_ids(engine):
    X = znormed(30, 32, seed=9)
    ids = np.arange(30) * 7
    res = engine(X, X[3][None, :], k=1, ids=ids)
    assert res[0][0][1] == 21


@pytest.mark.parametrize("engine", [ucr_knn, flat_knn])
def test_k_exceeds_collection(engine):
    X = znormed(4, 32, seed=10)
    res = engine(X, X[:1], k=99)
    assert len(res[0]) == 4


@pytest.mark.parametrize("engine", [ucr_knn, flat_knn])
def test_results_sorted(engine):
    X = znormed(80, 48, seed=11)
    res = engine(X, znormed(2, 48, seed=12), k=10)
    for r in res:
        assert [d for d, _ in r] == sorted(d for d, _ in r)


@pytest.mark.parametrize("block,head", [(1, 1), (7, 16), (512, 48), (512, 1000)])
def test_ucr_blocking_does_not_change_result(block, head):
    X = znormed(100, 48, seed=13)
    Q = znormed(3, 48, seed=14)
    got = ucr_knn(X, Q, k=4, block=block, head=head)
    exp = flat_knn(X, Q, k=4)
    for a, b in zip(got, exp):
        assert [i for _, i in a] == [i for _, i in b]


def test_single_query_single_series():
    X = znormed(1, 16, seed=15)
    for engine in (ucr_knn, flat_knn):
        res = engine(X, X, k=1)
        assert res[0][0][1] == 0
