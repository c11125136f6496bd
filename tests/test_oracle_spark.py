"""DuckDB-oracle checks for the relational pieces of the pipeline.

The clustering itself is validated against brute-force DBSCAN; here the
*dataflows* are validated the SQL way: ε-neighborhood counting expressed in
Spark SQL is diffed against DuckDB running the identical query, and the
counts are then tied back to the core flags our algorithm produces.
"""
import numpy as np
import pandas as pd
import pytest

from repro.core.exact import exact_dbscan
from repro.data.clustergen import make_moons
from repro.metrics.space import EuclideanMetric
from repro.oracle import assert_equivalent

EUC = EuclideanMetric()
EPS, MINPTS = 0.15, 10


@pytest.fixture(scope="module")
def pts_pdf():
    X, _ = make_moons(300, seed=0)
    return pd.DataFrame({"id": np.arange(len(X)), "x": X[:, 0], "y": X[:, 1]})


NEIGHBOR_SQL = f"""
    SELECT a.id AS id, CAST(COUNT(*) AS BIGINT) AS cnt
    FROM pts a JOIN pts b
      ON (a.x - b.x) * (a.x - b.x) + (a.y - b.y) * (a.y - b.y) <= {EPS * EPS}
    GROUP BY a.id
"""


def test_neighbor_counts_spark_vs_duckdb(spark, pts_pdf):
    df = spark.createDataFrame(pts_pdf)
    df.createOrReplaceTempView("pts")
    got = spark.sql(NEIGHBOR_SQL)
    assert_equivalent(got, NEIGHBOR_SQL, pts=pts_pdf)


def test_sql_counts_match_core_flags(spark, pts_pdf):
    """counts ≥ MinPts from the SQL dataflow ≡ our algorithm's core flags."""
    df = spark.createDataFrame(pts_pdf)
    df.createOrReplaceTempView("pts")
    rows = spark.sql(NEIGHBOR_SQL).collect()
    counts = np.zeros(len(pts_pdf), dtype=np.int64)
    for r in rows:
        counts[r.id] = r.cnt
    X = pts_pdf[["x", "y"]].to_numpy()
    res = exact_dbscan(X, EUC, EPS, MINPTS)
    assert np.array_equal(counts >= MINPTS, res.is_core)


def test_cluster_summary_spark_vs_duckdb(spark, pts_pdf):
    X = pts_pdf[["x", "y"]].to_numpy()
    res = exact_dbscan(X, EUC, EPS, MINPTS)
    lab = pd.DataFrame(
        {"id": np.arange(len(X)), "label": res.labels, "x": X[:, 0]}
    )
    sql = """
        SELECT label, CAST(COUNT(*) AS BIGINT) AS sz,
               ROUND(AVG(x), 6) AS cx
        FROM lab GROUP BY label
    """
    df = spark.createDataFrame(lab)
    df.createOrReplaceTempView("lab")
    assert_equivalent(spark.sql(sql), sql, lab=lab)
