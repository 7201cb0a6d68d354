"""Spark-layer integration tests: distributed exact k-NN, MCB-on-Spark,
the GEMINI DataFrame plan, and the DuckDB oracle on all of them."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import flat_knn
from repro.core.znorm import znormalize
from repro.datasets.registry import make_dataset, make_queries
from repro.distrib import (exact_knn, fit_sfa_spark, gemini_knn_sql,
                           series_df, to_matrix, with_words)
from repro.distrib.search import METHODS
from repro.oracle import assert_equivalent
from tests.helpers import znormed

N, LEN, NPART = 300, 64, 4


@pytest.fixture(scope="module")
def data():
    X = znormed(N, LEN, seed=42)
    Q = znormed(4, LEN, seed=43)
    return X, Q


@pytest.fixture(scope="module")
def df(spark, data):
    X, _ = data
    d = series_df(spark, X, num_partitions=NPART).cache()
    d.count()
    yield d
    d.unpersist()


@pytest.fixture(scope="module")
def summary(df):
    return fit_sfa_spark(df, fraction=0.5, l=8, alphabet=32, seed=1)


def _long(mat: np.ndarray, idcol: str) -> pd.DataFrame:
    """Explode a series matrix to (id, pos, value) rows for the SQL oracle."""
    n, ln = mat.shape
    return pd.DataFrame({
        idcol: np.repeat(np.arange(n), ln),
        "pos": np.tile(np.arange(ln), n),
        "value": mat.astype(np.float64).ravel(),
    })


KNN_SQL = """
WITH d AS (
  SELECT q.query_id, s.series_id,
         SUM((q.value - s.value) * (q.value - s.value)) AS d2
  FROM queries_long q JOIN data_long s USING (pos)
  GROUP BY q.query_id, s.series_id
)
SELECT query_id, series_id, SQRT(d2) AS dist,
       ROW_NUMBER() OVER (PARTITION BY query_id ORDER BY d2, series_id) AS rank
FROM d QUALIFY rank <= {k}
"""


# ------------------------------------------------------------------ dataset
def test_series_df_roundtrip(spark, data):
    X, _ = data
    d = series_df(spark, X, num_partitions=3)
    assert d.rdd.getNumPartitions() == 3
    ids, X2 = to_matrix(d.toPandas())
    assert sorted(ids.tolist()) == list(range(N))
    np.testing.assert_allclose(X2, X[ids], atol=1e-6)


def test_to_matrix_sorts_by_id():
    pdf = pd.DataFrame({"id": [3, 1, 2],
                        "series": [np.ones(4) * i for i in (3, 1, 2)]})
    ids, X = to_matrix(pdf)
    assert ids.tolist() == [1, 2, 3]
    np.testing.assert_allclose(X[:, 0], [1, 2, 3])


def test_series_df_custom_ids(spark):
    X = znormed(5, 16, seed=1)
    d = series_df(spark, X, ids=np.array([10, 20, 30, 40, 50]))
    assert sorted(r["id"] for r in d.select("id").collect()) == [10, 20, 30, 40, 50]


# ---------------------------------------------------------------------- mcb
def test_fit_sfa_spark_valid_summary(summary):
    assert summary.l == 8
    assert summary.edges.shape == (8, 33)
    assert (np.diff(summary.edges[:, 1:-1], axis=1) >= -1e-12).all()


def test_fit_sfa_spark_small_fraction_falls_back(spark):
    X = znormed(100, 32, seed=2)
    d = series_df(spark, X)
    s = fit_sfa_spark(d, fraction=0.001, l=4, alphabet=8)
    assert s.l == 4  # fell back to the minimum sample rather than failing


def test_fit_sfa_spark_matches_local_fit_distribution(df, data, summary):
    # learned bins must cover the bulk of the data's component values
    X, _ = data
    comps = summary.approx(X)
    words = summary.words_from_approx(comps)
    assert words.min() >= 0 and words.max() <= 31


# ------------------------------------------------------------- exact search
@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("k", [1, 3])
def test_exact_knn_matches_brute_force(spark, df, data, summary, method, k):
    X, Q = data
    res = exact_knn(df, Q, k=k, method=method, summary=summary,
                    leaf_size=32).toPandas().sort_values(["query_id", "rank"])
    exp = flat_knn(X, Q, k=k)
    for qi in range(len(Q)):
        got = res[res.query_id == qi]
        assert got.series_id.tolist() == [i for _, i in exp[qi]]
        np.testing.assert_allclose(got.dist.tolist(),
                                   [d for d, _ in exp[qi]], atol=1e-5)


@pytest.mark.parametrize("method", ["sofa", "flat"])
def test_exact_knn_against_duckdb_oracle(spark, df, data, summary, method):
    """Full-pipeline oracle: the Spark result frame equals brute-force
    k-NN expressed in SQL over exploded series tables."""
    X, Q = data
    k = 2
    res = exact_knn(df, Q, k=k, method=method, summary=summary, leaf_size=32)
    assert_equivalent(res, KNN_SQL.format(k=k),
                      data_long=_long(X, "series_id"),
                      queries_long=_long(Q, "query_id"))


def test_exact_knn_requires_summary_for_sofa(df, data):
    _, Q = data
    with pytest.raises(ValueError):
        exact_knn(df, Q, method="sofa")


def test_exact_knn_rejects_unknown_method(df, data):
    _, Q = data
    with pytest.raises(ValueError):
        exact_knn(df, Q, method="faiss-gpu")


def test_exact_knn_with_cache_token_is_stable(spark, df, data, summary):
    X, Q = data
    a = exact_knn(df, Q, k=1, method="sofa", summary=summary, leaf_size=32,
                  cache_token="t1").toPandas().sort_values("query_id")
    b = exact_knn(df, Q, k=1, method="sofa", summary=summary, leaf_size=32,
                  cache_token="t1").toPandas().sort_values("query_id")
    pd.testing.assert_frame_equal(a.reset_index(drop=True),
                                  b.reset_index(drop=True))


def test_exact_knn_single_partition(spark, data, summary):
    X, Q = data
    d1 = series_df(spark, X, num_partitions=1)
    res = exact_knn(d1, Q, k=1, method="messi", leaf_size=32).toPandas()
    exp = flat_knn(X, Q, k=1)
    got = res.sort_values("query_id").series_id.tolist()
    assert got == [exp[qi][0][1] for qi in range(len(Q))]


# -------------------------------------------------- GEMINI as DataFrame plan
def test_with_words_schema_and_values(spark, df, summary, data):
    X, _ = data
    out = with_words(df, summary).toPandas().sort_values("id")
    words = np.stack(out.word.to_numpy()).astype(np.uint8)
    np.testing.assert_array_equal(words, summary.words(X[out.id.to_numpy()]))


def test_gemini_sql_plan_exact(spark, df, data, summary):
    X, Q = data
    dfw = with_words(df, summary)
    out = gemini_knn_sql(dfw, summary, Q[0], k=3).toPandas()
    exp = flat_knn(X, Q[0][None, :], k=3)[0]
    assert out.series_id.tolist() == [i for _, i in exp]
    np.testing.assert_allclose(out.dist.tolist(), [d for d, _ in exp],
                               atol=1e-5)


def test_gemini_sql_plan_oracle(spark, df, data, summary):
    X, Q = data
    dfw = with_words(df, summary)
    out = gemini_knn_sql(dfw, summary, Q[1], k=2)
    sql = """
    WITH d AS (
      SELECT s.series_id,
             SUM((q.value - s.value) * (q.value - s.value)) AS d2
      FROM queries_long q JOIN data_long s USING (pos)
      GROUP BY s.series_id
    )
    SELECT series_id, SQRT(d2) AS dist,
           ROW_NUMBER() OVER (ORDER BY d2, series_id) AS rank
    FROM d QUALIFY rank <= 2
    """
    assert_equivalent(out, sql, data_long=_long(X, "series_id"),
                      queries_long=_long(Q[1][None, :], "query_id"))
