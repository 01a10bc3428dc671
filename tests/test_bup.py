"""Tests for the sequential baselines: BUP, the ParB simulator, and the
brute-force decomposition oracle."""
import pandas as pd
import pytest

from repro.core.bup import bup, bup_bruteforce, parb_simulate

from .conftest import (
    SMALL_GRAPHS,
    assert_tips_equal,
    complete_bipartite_pdf,
    random_pdf,
)


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_bup_equals_bruteforce(name):
    """Incremental delete-update peeling == recount-from-scratch peeling."""
    pdf = SMALL_GRAPHS[name]()
    got, _ = bup(pdf)
    ref = bup_bruteforce(pdf)
    assert_tips_equal(ref, got, name)


@pytest.mark.parametrize("name", sorted(SMALL_GRAPHS))
def test_parb_sim_equals_bup(name):
    pdf = SMALL_GRAPHS[name]()
    ref, m_bup = bup(pdf)
    got, m_sim = parb_simulate(pdf)
    assert_tips_equal(ref, got, name)
    assert m_sim.wedges == m_bup.wedges  # ParB traverses the same wedges
    assert m_sim.rounds <= m_bup.rounds  # batch rounds can only be fewer


@pytest.mark.parametrize("seed", range(8))
def test_bup_equals_bruteforce_random(seed):
    pdf = random_pdf(15, 12, 60, seed=seed)
    assert_tips_equal(bup_bruteforce(pdf), bup(pdf)[0], f"seed{seed}")


@pytest.mark.parametrize("a,b", [(2, 2), (3, 3), (4, 5), (5, 4)])
def test_complete_bipartite_tips(a, b):
    tips, _ = bup(complete_bipartite_pdf(a, b))
    assert (tips["tip"] == (a - 1) * (b * (b - 1) // 2)).all()


@pytest.mark.parametrize("name", ["star", "path"])
def test_zero_butterfly_graphs(name):
    tips, met = bup(SMALL_GRAPHS[name]())
    assert (tips["tip"] == 0).all()
    assert met.count_wedges == 0 or met.total_wedges >= 0


def test_v_side_decomposition():
    pdf = SMALL_GRAPHS["paper"]()
    tips_v, _ = bup(pdf, side="v")
    swapped = pdf.rename(columns={"u": "v", "v": "u"})[["u", "v"]]
    tips_swapped, _ = bup(swapped, side="u")
    assert_tips_equal(tips_swapped, tips_v, "v-side")


def test_spark_frame_input(spark):
    pdf = SMALL_GRAPHS["paper"]()
    sdf = spark.createDataFrame(pdf)
    assert_tips_equal(bup(pdf)[0], bup(sdf)[0], "spark-input")


def test_metrics_populated():
    pdf = SMALL_GRAPHS["rnd1"]()
    _, met = bup(pdf)
    assert met.seconds >= 0 and met.count_seconds >= 0
    assert met.rounds == pdf["u"].nunique()
    assert met.total_wedges == met.wedges + met.count_wedges
    assert met.completed


def test_parb_rounds_much_fewer_on_uniform_supports():
    """K_{a,b}: ParB peels everything in one or two rounds."""
    _, met = parb_simulate(complete_bipartite_pdf(5, 4))
    assert met.rounds <= 2


def test_tips_deterministic():
    pdf = SMALL_GRAPHS["rnd3"]()
    a, _ = bup(pdf)
    b, _ = bup(pdf)
    pd.testing.assert_frame_equal(a, b)
