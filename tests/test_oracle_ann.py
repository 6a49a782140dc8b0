"""DuckDB oracle checks for the ANN dataflow.

Distances and top-K sets are expressed as SQL over long-format
``(id, dim, val)`` tables and executed by both Spark SQL (Catalyst) and
DuckDB via ``repro.oracle.assert_equivalent`` — a wrong join/aggregation
or a broken distance kernel fails on *values*, not just on "it ran".
"""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.vectors.generate import base_numpy, queries_numpy
from repro.vectors.specs import get_spec

K = 3

DIST_SQL = """
    SELECT q.qid AS qid, b.id AS id,
           SUM((b.val - q.val) * (b.val - q.val)) AS dist2
    FROM base b JOIN query q ON b.dim = q.dim
    GROUP BY q.qid, b.id
"""

TOPK_SQL = f"""
    SELECT qid, dist2 FROM (
        SELECT qid, id, dist2,
               ROW_NUMBER() OVER (PARTITION BY qid ORDER BY dist2, id)
                   AS rnk
        FROM ({DIST_SQL})
    ) WHERE rnk <= {K}
"""


def _long(mat: np.ndarray, idcol: str) -> pd.DataFrame:
    n, d = mat.shape
    return pd.DataFrame(
        {
            idcol: np.repeat(np.arange(n), d),
            "dim": np.tile(np.arange(d), n),
            "val": mat.astype(np.float64).ravel(),
        }
    )


@pytest.fixture(scope="module")
def long_tables():
    from dataclasses import replace

    spec = replace(get_spec("sift1m"), dim=8)
    x = base_numpy(spec, 48 / spec.paper_size)
    q = queries_numpy(spec, 48 / spec.paper_size)[:4]
    return x, q, _long(x, "id"), _long(q, "qid")


def test_spark_sql_distance_table_matches_duckdb(spark, long_tables):
    x, q, base_l, query_l = long_tables
    spark.createDataFrame(base_l).createOrReplaceTempView("base")
    spark.createDataFrame(query_l).createOrReplaceTempView("query")
    got = spark.sql(DIST_SQL)
    assert_equivalent(got, DIST_SQL, base=base_l, query=query_l)


def test_spark_sql_topk_matches_duckdb(spark, long_tables):
    x, q, base_l, query_l = long_tables
    spark.createDataFrame(base_l).createOrReplaceTempView("base")
    spark.createDataFrame(query_l).createOrReplaceTempView("query")
    got = spark.sql(TOPK_SQL)
    assert_equivalent(got, TOPK_SQL, base=base_l, query=query_l)


def test_numpy_kernel_matches_duckdb(spark, long_tables):
    # The engine's (diff*diff).sum kernel vs the SQL definition.
    x, q, base_l, query_l = long_tables
    rows = []
    for qi in range(len(q)):
        d = ((x.astype(np.float64) - q[qi].astype(np.float64)) ** 2).sum(1)
        for i in range(len(x)):
            rows.append((qi, i, float(d[i])))
    got = spark.createDataFrame(
        pd.DataFrame(rows, columns=["qid", "id", "dist2"])
    )
    assert_equivalent(got, DIST_SQL, base=base_l, query=query_l)


def test_engine_topk_matches_duckdb(spark, long_tables, built, ds):
    # End-to-end: the distributed engine's top-K distances against the
    # oracle's SQL top-K over the same data (full probe = exact).
    x = ds["x"]
    q = ds["q"][:4]
    res = built["harmony"].search(q, k=K, nprobe=ds["ivf"].nlist)
    rows = []
    for qi in range(len(q)):
        for j in range(K):
            rows.append((qi, float(res.dists[qi, j])))
    got = spark.createDataFrame(
        pd.DataFrame(rows, columns=["qid", "dist2"])
    )
    assert_equivalent(
        got, TOPK_SQL, base=_long(x, "id"), query=_long(q, "qid")
    )
