"""Tests for the Spark dataflow ParB baseline against the exact
simulator (same algorithm, sequential substrate)."""
import pytest

from repro.core.bup import bup, parb_simulate
from repro.core.parb import parb_spark

from .conftest import SMALL_GRAPHS, assert_tips_equal


@pytest.mark.parametrize("name", ["paper", "k33", "rnd1"])
def test_matches_simulator(spark, name):
    pdf = SMALL_GRAPHS[name]()
    edges = spark.createDataFrame(pdf)
    tips_sim, m_sim = parb_simulate(pdf)
    tips_sp, m_sp = parb_spark(edges)
    assert m_sp.completed
    assert_tips_equal(tips_sim, tips_sp, name)
    assert m_sp.rounds == m_sim.rounds
    assert m_sp.wedges == m_sim.wedges


def test_matches_bup(spark):
    pdf = SMALL_GRAPHS["rnd2"]()
    edges = spark.createDataFrame(pdf)
    tips_sp, m_sp = parb_spark(edges)
    assert m_sp.completed
    assert_tips_equal(bup(pdf)[0], tips_sp, "vs-bup")


def test_v_side(spark):
    pdf = SMALL_GRAPHS["paper"]()
    edges = spark.createDataFrame(pdf)
    tips_sp, m_sp = parb_spark(edges, side="v")
    assert m_sp.completed
    assert_tips_equal(bup(pdf, side="v")[0], tips_sp, "v-side")


def test_budget_cutoff_partial_but_correct(spark):
    """Exhausting the round budget must yield a correct *prefix* of tips."""
    pdf = SMALL_GRAPHS["rnd1"]()
    edges = spark.createDataFrame(pdf)
    tips_sp, m_sp = parb_spark(edges, max_rounds=2)
    assert not m_sp.completed
    assert m_sp.rounds == 2
    ref, _ = bup(pdf)
    mrg = ref.merge(tips_sp, on="u", suffixes=("_ref", "_got"))
    assert len(mrg) == len(tips_sp) < len(ref)
    assert (mrg["tip_ref"] == mrg["tip_got"]).all()
