"""Seeded synthetic bipartite graphs mimicking the paper's KONECT datasets.

The paper evaluates on six KONECT bipartite graphs (Italian/English
Wikipedia edit graphs, Delicious user-tag, Orkut and LiveJournal group
memberships, the `trackers` web-tracking graph) with 12.6M-327M edges.
Those downloads are unavailable offline, and graphs of that size are out
of reach for a single-node PySpark reproduction anyway, so we substitute
*seeded two-sided Zipf generators*: each endpoint of an edge is drawn
from a Zipf-like rank distribution over its side, then duplicate edges
are dropped.

Per-dataset configs (:data:`CONFIGS`) are scaled down ~10^3-10^4x but
preserve the *relative* structure that drives tip-decomposition cost:
``|U|/|V|`` ratio, average degrees ``d_U/d_V``, and the degree skew of
each side (``trackers`` being the most skewed). Wedge counts — the
actual workload — follow from these. See DESIGN.md §3 for the
substitution argument.

Vertex ids are ``0..n_u-1`` and ``0..n_v-1``; id 0 is the highest-degree
vertex of its side (rank order — harmless, peeling is id-agnostic).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class GraphConfig:
    """Generator parameters for one synthetic dataset.

    ``alpha_u``/``alpha_v`` are the Zipf exponents of the two endpoint
    distributions (0 = uniform; larger = more skewed; >= ~1 produces a
    few huge hubs, which is what makes a side's wedge count explode).
    """

    n_u: int
    n_v: int
    m: int
    alpha_u: float
    alpha_v: float
    seed: int = 0


#: Scaled-down stand-ins for the paper's Table 2 datasets (bench scale).
#: d_U/d_V ratios track the paper; alpha_v > alpha_u everywhere because in
#: every paper dataset the U side has (far) more wedges than the V side,
#: i.e. the V side carries the bigger hubs relative to its size.
CONFIGS: dict[str, GraphConfig] = {
    # pages-editors, |U|>>|V|, d_V ~ 92: tiny V side of heavy hubs
    "it": GraphConfig(n_u=2300, n_v=150, m=12_000, alpha_u=0.35, alpha_v=0.55, seed=11),
    # users-tags, both sides dense, d_V ~ 98
    "de": GraphConfig(n_u=4200, n_v=800, m=38_000, alpha_u=0.45, alpha_v=0.75, seed=12),
    # orkut memberships, d_U ~ 118 >> d_V: U side dense, V side larger
    "or": GraphConfig(n_u=1400, n_v=4400, m=56_000, alpha_u=0.30, alpha_v=0.90, seed=13),
    # livejournal memberships
    "lj": GraphConfig(n_u=3200, n_v=7500, m=40_000, alpha_u=0.40, alpha_v=0.80, seed=14),
    # english wikipedia, |U| large, d_U small
    "en": GraphConfig(n_u=10_000, n_v=1800, m=43_000, alpha_u=0.45, alpha_v=0.80, seed=15),
    # trackers: most skewed, few giant tracker hubs -> enormous U-side wedges
    "tr": GraphConfig(n_u=13_000, n_v=6000, m=52_000, alpha_u=0.55, alpha_v=1.05, seed=16),
}

#: Linear down-scale factors applied to (n_u, n_v, m) per named scale.
SCALES: dict[str, float] = {"bench": 1.0, "unit": 0.15, "tiny": 0.05}


def _zipf_choice(
    g: np.random.Generator, n: int, alpha: float, size: int
) -> np.ndarray:
    """``size`` draws from ranks ``0..n-1`` with P(r) ∝ (r+1)^-alpha."""
    ranks = np.arange(1, n + 1, dtype=np.float64)
    w = ranks**-alpha
    w /= w.sum()
    return g.choice(n, size=size, p=w)


def bipartite_edges_np(cfg: GraphConfig) -> tuple[np.ndarray, np.ndarray]:
    """Generate a deduplicated edge list ``(eu, ev)`` for ``cfg``.

    Oversamples by 60% then dedupes, so the realized edge count is close
    to (and never above) ``cfg.m``. Deterministic in ``cfg.seed``.
    """
    g = np.random.default_rng(cfg.seed)
    n_try = int(cfg.m * 1.6)
    eu = _zipf_choice(g, cfg.n_u, cfg.alpha_u, n_try).astype(np.int64)
    ev = _zipf_choice(g, cfg.n_v, cfg.alpha_v, n_try).astype(np.int64)
    key = eu * np.int64(cfg.n_v) + ev
    _, idx = np.unique(key, return_index=True)
    idx.sort()
    idx = idx[: cfg.m]
    return eu[idx], ev[idx]


def scaled(cfg: GraphConfig, scale: str | float) -> GraphConfig:
    """``cfg`` with (n_u, n_v, m) multiplied by the named or numeric scale."""
    f = SCALES[scale] if isinstance(scale, str) else float(scale)
    return GraphConfig(
        n_u=max(4, int(cfg.n_u * f)),
        n_v=max(4, int(cfg.n_v * f)),
        m=max(4, int(cfg.m * f)),
        alpha_u=cfg.alpha_u,
        alpha_v=cfg.alpha_v,
        seed=cfg.seed,
    )


def dataset_pdf(name: str, scale: str | float = "bench") -> pd.DataFrame:
    """Pandas edge list ``(u, v)`` for a named dataset at a named scale."""
    eu, ev = bipartite_edges_np(scaled(CONFIGS[name], scale))
    return pd.DataFrame({"u": eu, "v": ev})


def dataset_edges(
    spark: SparkSession, name: str, scale: str | float = "bench"
) -> DataFrame:
    """Spark edge DataFrame ``(u: long, v: long)`` for a named dataset."""
    return spark.createDataFrame(dataset_pdf(name, scale))


def random_bipartite(
    spark: SparkSession,
    *,
    n_u: int,
    n_v: int,
    m: int,
    alpha_u: float = 0.0,
    alpha_v: float = 0.0,
    seed: int = 0,
) -> DataFrame:
    """Ad-hoc random bipartite graph — used heavily by property tests."""
    cfg = GraphConfig(n_u=n_u, n_v=n_v, m=m, alpha_u=alpha_u, alpha_v=alpha_v, seed=seed)
    eu, ev = bipartite_edges_np(cfg)
    return spark.createDataFrame(pd.DataFrame({"u": eu, "v": ev}))
