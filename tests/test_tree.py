"""Tests for the MESSI-style tree: build invariants and exact search."""
import numpy as np
import pytest

from repro.core.znorm import znormalize
from repro.datasets.generators import seismic, sine_mix, vector_gaussian
from repro.datasets.registry import make_dataset, make_queries
from repro.index import build_messi, build_sofa
from repro.index.tree import SearchStats, TreeIndex
from repro.summaries.sax import SAXSummary
from tests.helpers import brute_knn, znormed

BUILDERS = [("sofa", build_sofa), ("messi", build_messi)]


def _gen(kind, n_series, length, seed):
    if kind == "noise":
        return znormed(n_series, length, seed=seed)
    if kind == "seismic":
        return znormalize(seismic(n_series, length, seed=seed))
    if kind == "sine":
        return znormalize(sine_mix(n_series, length, seed=seed))
    return znormalize(vector_gaussian(n_series, length, seed=seed))


# ------------------------------------------------------------------ build
@pytest.mark.parametrize("name,builder", BUILDERS)
@pytest.mark.parametrize("leaf_size", [1, 4, 32, 1000])
def test_all_series_in_exactly_one_leaf(name, builder, leaf_size):
    X = znormed(200, 64, seed=1)
    idx = builder(X, leaf_size=leaf_size)
    assert sorted(idx.perm.tolist()) == list(range(200))
    assert idx.leaf_start[-1] == 200


@pytest.mark.parametrize("name,builder", BUILDERS)
def test_leaf_capacity_respected(name, builder):
    X = znormed(500, 64, seed=2)
    idx = builder(X, leaf_size=16)
    sizes = np.diff(idx.leaf_start)
    # leaves may only exceed capacity when every position is at max bits
    for nd, size in zip(idx.leaves, sizes):
        if size > 16:
            assert (nd.bits == idx.word_bits).all()


def test_leaf_words_match_leaf_symbols():
    """Every series in a leaf agrees with the leaf's variable-cardinality
    word on all positions (prefix property)."""
    X = znormed(300, 64, seed=3)
    idx = build_messi(X, leaf_size=8)
    for nd in idx.leaves:
        prefix = idx.words[nd.rows].astype(np.int64) >> \
            (idx.word_bits - nd.bits)[None, :]
        assert (prefix == nd.symbols[None, :]).all()


def test_root_keys_are_first_bits():
    X = znormed(100, 64, seed=4)
    idx = build_sofa(X, leaf_size=32)
    for key, nd in idx.root.items():
        assert (np.asarray(key) == nd.symbols).all()  # 1-bit prefix word
        assert (np.asarray(key) < 2).all()
        assert (nd.bits == 1).all()


def test_structure_stats_consistent():
    X = znormed(400, 64, seed=5)
    idx = build_messi(X, leaf_size=16)
    st = idx.structure_stats()
    assert st["n_leaves"] == len(idx.leaves)
    assert st["root_fanout"] == len(idx.root)
    assert st["mean_depth"] >= 1.0
    assert 0 < st["mean_leaf_fill"] <= 500 / 16


def test_empty_index():
    s = SAXSummary(32, l=8, alphabet=16)
    idx = TreeIndex(s, np.zeros((0, 32), np.float32))
    assert idx.knn(np.zeros(32)) == []


def test_single_series_index():
    X = znormed(1, 32, seed=6)
    idx = build_messi(X, leaf_size=4)
    res = idx.knn(X[0], k=1)
    assert res[0][1] == 0 and res[0][0] == pytest.approx(0.0, abs=1e-3)


def test_custom_ids_returned():
    X = znormed(50, 32, seed=7)
    ids = np.arange(50) * 10 + 3
    idx = build_messi(X, ids=ids, leaf_size=8)
    res = idx.knn(X[5], k=1)
    assert res[0][1] == 53


def test_ids_length_mismatch_raises():
    with pytest.raises(ValueError):
        build_messi(znormed(5, 32), ids=np.arange(4))


def test_bad_leaf_size_raises():
    with pytest.raises(ValueError):
        build_messi(znormed(5, 32), leaf_size=0)


# ----------------------------------------------------------------- search
@pytest.mark.parametrize("name,builder", BUILDERS)
@pytest.mark.parametrize("kind", ["noise", "seismic", "sine", "vector"])
@pytest.mark.parametrize("k", [1, 5])
def test_exact_vs_brute_force(name, builder, kind, k):
    X = _gen(kind, 400, 96, seed=11).astype(np.float32)
    Q = _gen(kind, 6, 96, seed=99).astype(np.float32)
    idx = builder(X, leaf_size=32)
    for q in Q:
        got = idx.knn(q, k=k)
        exp = brute_knn(X, q, k)
        assert [i for _, i in got] == [i for _, i in exp]
        np.testing.assert_allclose([d for d, _ in got], [d for d, _ in exp],
                                   atol=1e-5)


@pytest.mark.parametrize("name,builder", BUILDERS)
@pytest.mark.parametrize("leaf_size", [1, 7, 64, 10_000])
def test_exact_for_any_leaf_size(name, builder, leaf_size):
    X = znormed(250, 64, seed=21)
    Q = znormed(4, 64, seed=22)
    idx = builder(X, leaf_size=leaf_size)
    for q in Q:
        assert [i for _, i in idx.knn(q, k=3)] == \
            [i for _, i in brute_knn(X, q, 3)]


@pytest.mark.parametrize("chunk_rows", [1, 64, 100_000])
def test_exact_for_any_chunk_granularity(chunk_rows):
    X = znormed(300, 64, seed=23)
    idx = build_sofa(X, leaf_size=16)
    q = znormed(1, 64, seed=24)[0]
    got = idx.knn(q, k=4, chunk_rows=chunk_rows)
    assert [i for _, i in got] == [i for _, i in brute_knn(X, q, 4)]


@pytest.mark.parametrize("name,builder", BUILDERS)
def test_query_identical_to_stored_series(name, builder):
    X = znormed(100, 64, seed=25)
    idx = builder(X, leaf_size=8)
    res = idx.knn(X[42], k=1)
    assert res[0][1] == 42
    assert res[0][0] == pytest.approx(0.0, abs=1e-3)


def test_k_larger_than_collection():
    X = znormed(5, 32, seed=26)
    idx = build_messi(X, leaf_size=2)
    assert len(idx.knn(X[0], k=50)) == 5


@pytest.mark.parametrize("name,builder", BUILDERS)
def test_knn_ordering_and_monotone_in_k(name, builder):
    X = znormed(300, 64, seed=27)
    idx = builder(X, leaf_size=16)
    q = znormed(1, 64, seed=28)[0]
    r5 = idx.knn(q, k=5)
    r10 = idx.knn(q, k=10)
    assert r10[:5] == r5
    d = [x[0] for x in r10]
    assert d == sorted(d)


def test_stats_populated_and_pruning_on_clustered_data():
    X = make_dataset("SCEDC", scale=0.2)
    idx = build_sofa(X.astype(np.float32), leaf_size=64)
    q = make_queries("SCEDC", 1, scale=0.2)[0]
    st = SearchStats()
    idx.knn(q.astype(np.float32), k=1, stats=st)
    assert st.n_series == len(X)
    assert st.series_ed_computed >= 1
    assert st.pruning_ratio > 0.5  # SFA prunes hard on clustered seismic


def test_sofa_prunes_better_than_messi_on_high_freq():
    """The paper's headline mechanism (Section V-D / Figure 12)."""
    X = make_dataset("LenDB", scale=0.3).astype(np.float32)
    Q = make_queries("LenDB", 5, scale=0.3).astype(np.float32)
    sofa = build_sofa(X, leaf_size=64)
    messi = build_messi(X, leaf_size=64)
    pr_s, pr_m = [], []
    for q in Q:
        ss, sm = SearchStats(), SearchStats()
        sofa.knn(q, stats=ss)
        messi.knn(q, stats=sm)
        pr_s.append(ss.pruning_ratio)
        pr_m.append(sm.pruning_ratio)
    assert np.mean(pr_s) > np.mean(pr_m) + 0.3


def test_pre_fit_summary_reused():
    from repro.summaries.sfa import SFASummary
    X = znormed(200, 64, seed=30)
    s = SFASummary.fit(X[:50], l=8, alphabet=32)
    idx = build_sofa(X, summary=s, leaf_size=16)
    assert idx.summary is s
    q = znormed(1, 64, seed=31)[0]
    assert [i for _, i in idx.knn(q, k=2)] == \
        [i for _, i in brute_knn(X, q, 2)]
