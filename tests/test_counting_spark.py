"""Tests for the Spark dataflow butterfly counting (paper alg. 1),
checked against the DuckDB oracle and the NumPy counter."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.bup import edges_to_numpy
from repro.core.counting import per_vertex_butterflies, support_init
from repro.core.kernel import count_butterflies_np
from repro.graph import bipartite as bg
from repro.oracle import assert_equivalent

from .conftest import SMALL_GRAPHS

#: DuckDB reference for per-vertex butterfly counts of the U side
U_COUNT_SQL = """
WITH w AS (
  SELECT e1.u AS u1, e2.u AS u2
  FROM edges e1 JOIN edges e2 ON e1.v = e2.v AND e1.u < e2.u
), p AS (
  SELECT u1, u2, COUNT(*) AS c FROM w GROUP BY u1, u2
), contrib AS (
  SELECT u1 AS u, (c * (c - 1)) // 2 AS b FROM p
  UNION ALL
  SELECT u2 AS u, (c * (c - 1)) // 2 AS b FROM p
)
SELECT au.u AS u, CAST(COALESCE(s.b, 0) AS BIGINT) AS bcnt
FROM (SELECT DISTINCT u FROM edges) au
LEFT JOIN (SELECT u, SUM(b) AS b FROM contrib GROUP BY u) s USING (u)
"""

#: DuckDB reference for the V side (opposite-side contributions)
V_COUNT_SQL = """
WITH w AS (
  SELECT e1.u AS u1, e2.u AS u2, e1.v AS v
  FROM edges e1 JOIN edges e2 ON e1.v = e2.v AND e1.u < e2.u
), p AS (
  SELECT u1, u2, COUNT(*) AS c FROM w GROUP BY u1, u2
), contrib AS (
  SELECT w.v AS v, p.c - 1 AS b FROM w JOIN p USING (u1, u2)
)
SELECT av.v AS v, CAST(COALESCE(s.b, 0) AS BIGINT) AS bcnt
FROM (SELECT DISTINCT v FROM edges) av
LEFT JOIN (SELECT v, SUM(b) AS b FROM contrib GROUP BY v) s USING (v)
"""


@pytest.fixture
def small_graph(spark, small_graph_pdf):
    return spark.createDataFrame(small_graph_pdf), small_graph_pdf


def test_u_counts_oracle(small_graph):
    edges, pdf = small_graph
    bc = per_vertex_butterflies(edges)
    assert_equivalent(bc.u_counts, U_COUNT_SQL, edges=pdf)


def test_v_counts_oracle(small_graph):
    edges, pdf = small_graph
    bc = per_vertex_butterflies(edges)
    assert_equivalent(bc.v_counts, V_COUNT_SQL, edges=pdf)


def test_matches_numpy(small_graph):
    edges, pdf = small_graph
    bc = per_vertex_butterflies(edges)
    n_u, n_v, eu, ev, u_ids, v_ids = edges_to_numpy(pdf)
    bu, bv, total, _ = count_butterflies_np(n_u, n_v, eu, ev)
    got_u = bc.u_counts.toPandas().set_index("u")["bcnt"]
    got_v = bc.v_counts.toPandas().set_index("v")["bcnt"]
    assert bc.total == total
    for i, uid in enumerate(u_ids):
        assert got_u[uid] == bu[i]
    for i, vid in enumerate(v_ids):
        assert got_v[vid] == bv[i]


def test_sum_identity(small_graph):
    edges, _ = small_graph
    bc = per_vertex_butterflies(edges)
    su = bc.u_counts.agg(F.sum("bcnt")).first()[0] or 0
    sv = bc.v_counts.agg(F.sum("bcnt")).first()[0] or 0
    assert su == sv == 2 * bc.total


@pytest.mark.parametrize("forced", ["u", "v"])
def test_enumeration_side_invariance(spark, forced):
    pdf = SMALL_GRAPHS["paper"]()
    edges = spark.createDataFrame(pdf)
    auto = per_vertex_butterflies(edges)
    forced_bc = per_vertex_butterflies(edges, enumerate_side=forced)
    pd.testing.assert_frame_equal(
        auto.u_counts.toPandas().sort_values("u").reset_index(drop=True),
        forced_bc.u_counts.toPandas().sort_values("u").reset_index(drop=True),
    )
    assert auto.total == forced_bc.total


def test_auto_picks_cheaper_side(spark):
    pdf = SMALL_GRAPHS["rnd2"]()  # 30 U x 10 V: sides differ
    edges = spark.createDataFrame(pdf)
    bc = per_vertex_butterflies(edges)
    wu = bg.side_wedge_total(edges, "u")
    wv = bg.side_wedge_total(edges, "v")
    assert bc.side == ("u" if wu <= wv else "v")
    assert bc.wedges == min(wu, wv)


def test_rejects_bad_side(spark):
    edges = spark.createDataFrame(SMALL_GRAPHS["star"]())
    with pytest.raises(ValueError):
        per_vertex_butterflies(edges, enumerate_side="x")


def test_support_init_covers_all_u(small_graph):
    edges, pdf = small_graph
    sup, bc = support_init(edges)
    got = sup.toPandas()
    assert set(got["u"]) == set(pdf["u"])
    assert (got["sup"] >= 0).all()
    assert int(got["sup"].sum()) == 2 * bc.total
