"""Tests for the synthetic KONECT-like dataset generators (numpy level —
no Spark needed for most, so the whole matrix stays fast)."""
import numpy as np
import pandas as pd
import pytest

from repro.graph.generators import (
    CONFIGS,
    SCALES,
    GraphConfig,
    _zipf_choice,
    bipartite_edges_np,
    dataset_pdf,
    scaled,
)

ALL = sorted(CONFIGS)


@pytest.mark.parametrize("name", ALL)
@pytest.mark.parametrize("scale", ["tiny", "unit"])
def test_no_duplicate_edges(name, scale):
    pdf = dataset_pdf(name, scale)
    assert not pdf.duplicated().any()


@pytest.mark.parametrize("name", ALL)
def test_deterministic(name):
    a = dataset_pdf(name, "tiny")
    b = dataset_pdf(name, "tiny")
    pd.testing.assert_frame_equal(a, b)


@pytest.mark.parametrize("name", ALL)
def test_id_ranges(name):
    cfg = scaled(CONFIGS[name], "tiny")
    eu, ev = bipartite_edges_np(cfg)
    assert eu.min() >= 0 and eu.max() < cfg.n_u
    assert ev.min() >= 0 and ev.max() < cfg.n_v
    assert len(eu) == len(ev) <= cfg.m


@pytest.mark.parametrize("name", ALL)
def test_edge_count_near_target(name):
    cfg = scaled(CONFIGS[name], "unit")
    eu, _ = bipartite_edges_np(cfg)
    assert len(eu) >= 0.7 * cfg.m  # dedupe loses some, not most


@pytest.mark.parametrize("name", ALL)
def test_scales_monotonic(name):
    sizes = [len(bipartite_edges_np(scaled(CONFIGS[name], s))[0])
             for s in ("tiny", "unit", "bench")]
    assert sizes[0] < sizes[1] < sizes[2]


@pytest.mark.parametrize("name", ALL)
def test_u_side_has_more_wedges(name):
    """Paper convention: U labels the side with more wedges (Table 2)."""
    cfg = scaled(CONFIGS[name], "unit")
    eu, ev = bipartite_edges_np(cfg)
    dv = np.bincount(ev, minlength=cfg.n_v)
    du = np.bincount(eu, minlength=cfg.n_u)
    wedges_u = int((dv * (dv - 1) // 2).sum())  # endpoints in U
    wedges_v = int((du * (du - 1) // 2).sum())
    assert wedges_u > wedges_v, (wedges_u, wedges_v)


def test_scaled_numeric_factor():
    cfg = scaled(CONFIGS["it"], 0.5)
    assert cfg.n_u == CONFIGS["it"].n_u // 2
    assert cfg.alpha_u == CONFIGS["it"].alpha_u


def test_scaled_floor():
    cfg = scaled(CONFIGS["it"], 1e-9)
    assert min(cfg.n_u, cfg.n_v, cfg.m) >= 4


@pytest.mark.parametrize("scale", sorted(SCALES))
def test_named_scales_valid(scale):
    assert 0 < SCALES[scale] <= 1.0


def test_zipf_choice_skew():
    g = np.random.default_rng(0)
    draws = _zipf_choice(g, 100, alpha=1.0, size=20000)
    counts = np.bincount(draws, minlength=100)
    assert counts[0] > counts[50] > 0
    assert counts.argmax() == 0


def test_zipf_choice_uniform_when_alpha_zero():
    g = np.random.default_rng(0)
    draws = _zipf_choice(g, 50, alpha=0.0, size=50000)
    counts = np.bincount(draws, minlength=50)
    assert counts.min() > 0.7 * counts.max()


def test_seed_changes_graph():
    a = bipartite_edges_np(GraphConfig(50, 50, 200, 0.4, 0.4, seed=1))
    b = bipartite_edges_np(GraphConfig(50, 50, 200, 0.4, 0.4, seed=2))
    assert not (len(a[0]) == len(b[0]) and (a[0] == b[0]).all() and (a[1] == b[1]).all())


@pytest.mark.parametrize("name", ALL)
def test_spark_loading(spark, name):
    from repro.experiments import datasets

    edges = datasets.load(spark, name, "tiny")
    assert set(edges.columns) == {"u", "v"}
    assert edges.schema["u"].dataType.typeName() == "long"


@pytest.mark.parametrize(
    "name,side,expect", [("it", "u", "ItU"), ("tr", "v", "TrV"), ("or", "u", "OrU")]
)
def test_labels(name, side, expect):
    from repro.experiments import datasets

    assert datasets.label(name, side) == expect
