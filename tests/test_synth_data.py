"""Smoke tests for the provided TPC-H-lite scaffolding and its data-series
extensions, wired through the DuckDB oracle."""
import numpy as np

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_oracle_aggregation(spark):
    """Keeps the provided oracle + TPC-H path alive: a Spark aggregation
    over lineitem must match DuckDB on identical input."""
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").sum("l_quantity") \
        .withColumnRenamed("sum(l_quantity)", "total_qty")
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS total_qty "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_data_series_extension(spark):
    df = synth_data.data_series(spark, name="Iquique", scale=0.02,
                                num_partitions=2)
    pdf = df.toPandas()
    assert {"id", "series"} <= set(pdf.columns)
    X = np.stack(pdf.series.to_numpy())
    np.testing.assert_allclose(X.mean(axis=1), 0, atol=1e-5)  # z-normalized


def test_data_series_queries_shape():
    q = synth_data.data_series_queries(name="Iquique", n_queries=5, scale=0.02)
    assert q.shape == (5, 256)


def test_data_series_deterministic(spark):
    a = synth_data.data_series(spark, name="SALD", scale=0.01).toPandas()
    b = synth_data.data_series(spark, name="SALD", scale=0.01).toPandas()
    a = a.sort_values("id").reset_index(drop=True)
    b = b.sort_values("id").reset_index(drop=True)
    np.testing.assert_allclose(np.stack(a.series), np.stack(b.series))
