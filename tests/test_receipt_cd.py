"""Tests for coarse-grained decomposition (alg. 3): range soundness
(lemmas 3-4), ⋈_init semantics, adaptive partitioning invariants."""
from itertools import combinations

import pandas as pd
import pytest

from repro.core.bup import bup
from repro.core.counting import support_init
from repro.core.receipt_cd import receipt_cd
from repro.graph import bipartite as bg

from .conftest import SMALL_GRAPHS, random_pdf


def _run_cd(spark, pdf, P=3, **kw):
    edges = spark.createDataFrame(pdf).localCheckpoint()
    oriented = bg.orient(edges, "u")
    sup, _ = support_init(oriented)
    return receipt_cd(oriented, sup, P, **kw)


def _pair_shared_butterflies(pdf) -> dict:
    """⋈_{u,u'} = C(|N_u ∩ N_u'|, 2) on the original graph (invariant
    under U-side peeling — both wedge centers live in V)."""
    nbrs: dict[int, set] = {}
    for u, v in pdf.itertuples(index=False):
        nbrs.setdefault(int(u), set()).add(int(v))
    out = {}
    for u1, u2 in combinations(sorted(nbrs), 2):
        c = len(nbrs[u1] & nbrs[u2])
        if c >= 2:
            out[(u1, u2)] = c * (c - 1) // 2
    return out


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_membership_partitions_u(spark, name):
    pdf = SMALL_GRAPHS[name]()
    cd = _run_cd(spark, pdf)
    assert sorted(cd.membership["u"]) == sorted(pdf["u"].unique())
    assert not cd.membership["u"].duplicated().any()


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_ranges_strictly_increasing(spark, name):
    cd = _run_cd(spark, SMALL_GRAPHS[name]())
    assert cd.ranges[0] == 0
    assert all(a < b for a, b in zip(cd.ranges, cd.ranges[1:]))
    assert cd.membership["subset"].max() <= len(cd.ranges) - 1


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_range_soundness(spark, name):
    """Lemmas 3-4: u in U_i  ⇒  θ(i) <= θ_u < θ(i+1)."""
    pdf = SMALL_GRAPHS[name]()
    cd = _run_cd(spark, pdf)
    tips, _ = bup(pdf)
    mrg = cd.membership.merge(tips, on="u")
    for _, row in mrg.iterrows():
        i = int(row["subset"])
        assert cd.ranges[i - 1] <= row["tip"] < cd.ranges[i], row


@pytest.mark.parametrize("name", ["paper", "rnd1", "k45"])
def test_init_sup_equals_shared_with_remaining(spark, name):
    """⋈_init of u in U_i == butterflies u shares with ∪_{j>=i} U_j
    (what FD's support initialization relies on, theorem 2)."""
    pdf = SMALL_GRAPHS[name]()
    cd = _run_cd(spark, pdf)
    pairs = _pair_shared_butterflies(pdf)
    subset_of = dict(zip(cd.membership["u"], cd.membership["subset"]))
    for _, row in cd.membership.iterrows():
        u, i = int(row["u"]), int(row["subset"])
        want = sum(
            b
            for (u1, u2), b in pairs.items()
            if (u1 == u and subset_of[u2] >= i) or (u2 == u and subset_of[u1] >= i)
        )
        assert row["init_sup"] == want, (u, i, row["init_sup"], want)


@pytest.mark.parametrize("huc,dgm", [(False, False), (True, False), (False, True)])
def test_membership_invariant_under_optimizations(spark, huc, dgm):
    """HUC/DGM change the work, never the computed supports — so the
    partition and ranges are bit-identical with and without them."""
    pdf = SMALL_GRAPHS["rnd1"]()
    base = _run_cd(spark, pdf, huc=True, dgm=True)
    other = _run_cd(spark, pdf, huc=huc, dgm=dgm)
    assert base.ranges == other.ranges
    pd.testing.assert_frame_equal(
        base.membership.sort_values("u").reset_index(drop=True),
        other.membership.sort_values("u").reset_index(drop=True),
    )


def test_p_one_single_subset(spark):
    pdf = SMALL_GRAPHS["paper"]()
    cd = _run_cd(spark, pdf, P=1)
    # everything lands in subset 1 (or spills into the single leftover 2)
    assert cd.membership["subset"].nunique() <= 2


def test_p_larger_than_n(spark):
    pdf = SMALL_GRAPHS["k33"]()
    cd = _run_cd(spark, pdf, P=50)
    assert sorted(cd.membership["u"]) == sorted(pdf["u"].unique())


def test_rounds_counted(spark):
    cd = _run_cd(spark, random_pdf(25, 20, 100, seed=4))
    assert cd.metrics.rounds > 0
    assert cd.metrics.wedges >= 0
    assert cd.metrics.seconds > 0


def test_huc_fires_on_wedge_heavy_graph(spark):
    """A hub-heavy graph has C_peel >> C_rcnt — HUC must trigger."""
    pdf = random_pdf(60, 6, 200, seed=5, alpha_u=0.2, alpha_v=1.0)
    cd = _run_cd(spark, pdf, huc=True, dgm=False)
    cd_off = _run_cd(spark, pdf, huc=False, dgm=False)
    assert cd.huc_recounts > 0
    assert cd.metrics.wedges < cd_off.metrics.wedges
