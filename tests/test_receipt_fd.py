"""Tests for fine-grained decomposition (alg. 4): independent per-subset
peeling must reproduce sequential BUP exactly (theorem 2)."""
import pandas as pd
import pytest

from repro.core.bup import bup
from repro.core.counting import support_init
from repro.core.receipt_cd import receipt_cd
from repro.core.receipt_fd import receipt_fd
from repro.graph import bipartite as bg

from .conftest import SMALL_GRAPHS, assert_tips_equal


def _oriented(spark, pdf):
    return bg.orient(spark.createDataFrame(pdf), "u").localCheckpoint()


def test_single_subset_equals_bup(spark):
    """With everything in one subset and ⋈_init = full counts, FD *is*
    sequential BUP — isolates FD from CD."""
    pdf = SMALL_GRAPHS["rnd1"]()
    edges = _oriented(spark, pdf)
    sup, _ = support_init(edges)
    membership = sup.toPandas().rename(columns={"sup": "init_sup"})
    membership["subset"] = 1
    fd = receipt_fd(edges, membership)
    assert_tips_equal(bup(pdf)[0], fd.tips, "fd-single")


@pytest.mark.parametrize("name", ["paper", "rnd2", "k45", "star"])
@pytest.mark.parametrize("dgm", [False, True])
def test_after_cd_equals_bup(spark, name, dgm):
    pdf = SMALL_GRAPHS[name]()
    edges = _oriented(spark, pdf)
    sup, _ = support_init(edges)
    cd = receipt_cd(edges, sup, 3)
    fd = receipt_fd(edges, cd.membership, dgm=dgm)
    assert_tips_equal(bup(pdf)[0], fd.tips, f"{name}-dgm{dgm}")


def test_subset_stats_cover_membership(spark):
    pdf = SMALL_GRAPHS["rnd3"]()
    edges = _oriented(spark, pdf)
    sup, _ = support_init(edges)
    cd = receipt_cd(edges, sup, 4)
    fd = receipt_fd(edges, cd.membership)
    assert int(fd.subset_stats["sub_size"].sum()) == len(cd.membership)
    assert set(fd.subset_stats["subset"]) == set(cd.membership["subset"])
    assert fd.metrics.wedges == int(fd.subset_stats["sub_wedges"].sum())
    assert fd.metrics.rounds == 0  # FD contributes nothing to ρ


def test_induced_subgraphs_traverse_fewer_wedges(spark):
    """The fig. 2 point: induced subgraphs collectively hold far fewer
    wedges than the full graph."""
    pdf = SMALL_GRAPHS["rnd2"]()
    edges = _oriented(spark, pdf)
    sup, _ = support_init(edges)
    cd = receipt_cd(edges, sup, 4)
    fd = receipt_fd(edges, cd.membership)
    _, m_bup = bup(pdf)
    assert fd.metrics.wedges <= m_bup.wedges


def test_fd_handles_edgeless_members(spark):
    """A subset whose members have no edges peels at its init support."""
    pdf = SMALL_GRAPHS["paper"]()
    edges = _oriented(spark, pdf)
    membership = pd.DataFrame(
        {"u": sorted(pdf["u"].unique()), "init_sup": 0, "subset": 1}
    ).astype("int64")
    # vertex 999 exists in no edge: exercise the empty-cogroup path
    membership = pd.concat(
        [membership, pd.DataFrame({"u": [999], "init_sup": [7], "subset": [2]})],
        ignore_index=True,
    )
    fd = receipt_fd(edges, membership)
    assert int(fd.tips.set_index("u").loc[999, "tip"]) == 7
