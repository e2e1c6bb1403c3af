"""DataFrame-API Lloyd, verified against the DuckDB oracle.

These are the oracle-backed "query result" tests: refinement is a
groupBy-mean, cluster sizes a groupBy-count, SSE a join+sum — all
expressible in SQL and diffed row-for-row against DuckDB.
"""
import numpy as np
import pytest

from repro.core.df_lloyd import assign_df, lloyd_df, refine_df, sse_df
from repro.core.kernels import make_kernel
from repro.core.linalg import kmeans_pp_init
from repro.core.runner import LocalRunner
from repro.oracle import assert_equivalent
from repro.synth_data import gaussian_mixture, points_df
from pyspark.sql import functions as F


@pytest.fixture(scope="module")
def data(spark):
    X = gaussian_mixture(n=1200, d=3, n_centers=6, cluster_std=0.8, seed=11)
    df = points_df(spark, X).cache()
    df.count()
    C = kmeans_pp_init(X, 5, seed=3)
    return X, df, C


def test_assign_matches_numpy(data):
    X, df, C = data
    got = (
        assign_df(df, C).select("id", "cluster").toPandas().sort_values("id")
    )
    from repro.core.linalg import full_dists

    ref = full_dists(X, C).argmin(1)
    assert (got["cluster"].to_numpy() == ref).all()


def test_refinement_oracle(data):
    """Spark groupBy-mean refinement ≡ DuckDB AVG per cluster."""
    X, df, C = data
    assigned = assign_df(df, C)
    spark_out = refine_df(assigned)
    pdf = assigned.toPandas()
    assert_equivalent(
        spark_out,
        """
        SELECT cluster,
               avg(x0) AS c_x0, avg(x1) AS c_x1, avg(x2) AS c_x2
        FROM pts GROUP BY cluster
        """,
        pts=pdf,
    )


def test_cluster_sizes_oracle(data):
    X, df, C = data
    assigned = assign_df(df, C)
    sizes = assigned.groupBy("cluster").agg(F.count("*").alias("n_pts"))
    assert_equivalent(
        sizes,
        "SELECT cluster, count(*) AS n_pts FROM pts GROUP BY cluster",
        pts=assigned.toPandas(),
    )


def test_sse_oracle(data):
    X, df, C = data
    assigned = assign_df(df, C)
    spark_sse = sse_df(assigned, C)
    pdf = assigned.toPandas()
    import pandas as pd

    cdf = pd.DataFrame(C, columns=["c_x0", "c_x1", "c_x2"])
    cdf.insert(0, "cluster", np.arange(len(C)))
    assert_equivalent(
        spark_sse,
        """
        SELECT sum( (p.x0 - c.c_x0)*(p.x0 - c.c_x0)
                  + (p.x1 - c.c_x1)*(p.x1 - c.c_x1)
                  + (p.x2 - c.c_x2)*(p.x2 - c.c_x2) ) AS sse
        FROM pts p JOIN centroids c USING (cluster)
        """,
        pts=pdf,
        centroids=cdf,
    )


def test_lloyd_df_matches_kernel(data):
    """The Catalyst-side Lloyd and the RDD-side kernel agree."""
    X, df, C = data
    centers_df, _ = lloyd_df(df, 5, n_iters=4, centers0=C)
    ref = LocalRunner().run(X, 5, make_kernel("lloyd"), n_iters=4, centers0=C)
    assert np.allclose(np.sort(centers_df, axis=0), np.sort(ref.centers, axis=0), atol=1e-8)
