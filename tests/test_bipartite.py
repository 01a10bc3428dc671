"""Tests for the edge-DataFrame helpers, checked against the DuckDB
oracle wherever the quantity is SQL-expressible."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph import bipartite as bg
from repro.oracle import assert_equivalent

from .conftest import SMALL_GRAPHS


@pytest.fixture
def small_graph(spark, small_graph_pdf):
    return spark.createDataFrame(small_graph_pdf), small_graph_pdf


def test_orient_u_noop(spark):
    pdf = SMALL_GRAPHS["paper"]()
    edges = spark.createDataFrame(pdf)
    got = bg.orient(edges, "u").toPandas()
    assert sorted(map(tuple, got.values)) == sorted(map(tuple, pdf.values))


def test_orient_v_swaps(spark):
    pdf = SMALL_GRAPHS["paper"]()
    got = bg.orient(spark.createDataFrame(pdf), "v").toPandas()
    assert got["u"].tolist() == pdf["v"].tolist()
    assert got["v"].tolist() == pdf["u"].tolist()


def test_orient_rejects_bad_side(spark):
    edges = spark.createDataFrame(SMALL_GRAPHS["star"]())
    with pytest.raises(ValueError):
        bg.orient(edges, "w")


def test_validate_accepts(small_graph):
    edges, _ = small_graph
    bg.validate(edges)


def test_validate_rejects_duplicates(spark):
    pdf = pd.DataFrame({"u": [1, 1], "v": [2, 2]})
    with pytest.raises(AssertionError, match="duplicate"):
        bg.validate(spark.createDataFrame(pdf))


def test_validate_rejects_negative(spark):
    pdf = pd.DataFrame({"u": [-1], "v": [2]})
    with pytest.raises(AssertionError):
        bg.validate(spark.createDataFrame(pdf))


def test_validate_rejects_extra_columns(spark):
    pdf = pd.DataFrame({"u": [1], "v": [2], "w": [3]})
    with pytest.raises(AssertionError):
        bg.validate(spark.createDataFrame(pdf))


def test_degrees_oracle(small_graph):
    edges, pdf = small_graph
    got = bg.degrees(edges, "v").withColumn("deg", F.col("deg").cast("long"))
    assert_equivalent(
        got,
        "SELECT v, CAST(COUNT(*) AS BIGINT) AS deg FROM edges GROUP BY v",
        edges=pdf,
    )


def test_counts(small_graph):
    edges, pdf = small_graph
    assert bg.counts(edges) == (pdf["u"].nunique(), pdf["v"].nunique(), len(pdf))


def test_side_wedge_total_matches_formula(small_graph):
    edges, pdf = small_graph
    dv = pdf.groupby("v").size()
    du = pdf.groupby("u").size()
    assert bg.side_wedge_total(edges, "u") == int((dv * (dv - 1) // 2).sum())
    assert bg.side_wedge_total(edges, "v") == int((du * (du - 1) // 2).sum())


def test_vertex_wedge_counts_oracle(small_graph):
    edges, pdf = small_graph
    got = bg.vertex_wedge_counts(edges).withColumn("w", F.col("w").cast("long"))
    assert_equivalent(
        got,
        """
        SELECT e.u AS u, CAST(SUM(d.deg - 1) AS BIGINT) AS w
        FROM edges e
        JOIN (SELECT v, COUNT(*) AS deg FROM edges GROUP BY v) d USING (v)
        GROUP BY e.u
        """,
        edges=pdf,
    )


def test_vertex_wedge_counts_sum_identity(small_graph):
    """sum_u w[u] = 2 * (#wedges with endpoints in U)."""
    edges, _ = small_graph
    total = bg.vertex_wedge_counts(edges).agg(F.sum("w")).first()[0] or 0
    assert int(total) == 2 * bg.side_wedge_total(edges, "u")


def test_peel_cost_counts_oracle(small_graph):
    edges, pdf = small_graph
    got = bg.peel_cost_counts(edges).withColumn("c", F.col("c").cast("long"))
    assert_equivalent(
        got,
        """
        SELECT e.u AS u, CAST(SUM(d.deg) AS BIGINT) AS c
        FROM edges e
        JOIN (SELECT v, COUNT(*) AS deg FROM edges GROUP BY v) d USING (v)
        GROUP BY e.u
        """,
        edges=pdf,
    )


def test_induced_on_u(spark):
    pdf = SMALL_GRAPHS["paper"]()
    edges = spark.createDataFrame(pdf)
    members = spark.createDataFrame(pd.DataFrame({"u": [0, 2]}))
    got = bg.induced_on_u(edges, members).toPandas()
    want = pdf[pdf["u"].isin([0, 2])]
    assert sorted(map(tuple, got.values)) == sorted(map(tuple, want.values))


def test_recount_cost_matches_pandas(small_graph):
    edges, pdf = small_graph
    du = pdf.groupby("u")["v"].size()
    dv = pdf.groupby("v")["u"].size()
    want = int(
        pd.concat(
            [pdf["u"].map(du), pdf["v"].map(dv)], axis=1
        ).min(axis=1).sum()
    )
    assert bg.recount_cost(edges) == want
