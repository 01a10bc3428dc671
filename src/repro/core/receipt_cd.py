"""RECEIPT CD — coarse-grained decomposition (paper alg. 3) as an
iterative Spark dataflow.

Partitions the peel side ``U`` into ``P`` (occasionally ``P+1``) subsets
with non-overlapping tip-number ranges. Each iteration peels *every*
vertex whose support lies in the current range ``[θ(i), θ(i+1))`` with a
single batched 2-hop update join (:mod:`repro.core.peel_round`) — the
paper's key idea for collapsing ~10^5-10^6 min-support rounds into ~10^3
range rounds. The iteration count is the paper's ρ for RECEIPT.

Execution split: the O(wedges) work — the 2-hop message join and, when
HUC fires, full re-counting — runs as Spark dataflow; the O(n) vertex
support state and the O(m) HUC/DGM *cost model* (degree sums) live on
the driver, exactly as the paper keeps per-vertex/per-degree arrays in
shared memory beside its parallel wedge traversal. One peel iteration
is therefore exactly one Spark action (the update join), which keeps the
round structure — and hence ρ — identical to the paper's.

Implemented paper features:

* ``findHi`` range determination — histogram of current supports
  weighted by static wedge counts ``w[u]``, prefix-summed; the upper
  bound is the smallest support whose cumulative wedge count reaches the
  target.
* two-way adaptive ranges (§3.1.1) — the target is recomputed each range
  from the remaining wedge mass and scaled by
  ``s_i = min(1, tgt / covered_i)`` to damp overshoot.
* HUC (§4.1) — when ``C_peel = Σ_{u∈S} Σ_{v∈N_u} d_v^struct`` exceeds
  ``C_rcnt = Σ_{(u,v)∈E_alive} min(d_u, d_v)``, butterflies are
  re-counted on the surviving graph (Spark counting) instead of
  propagating updates.
* DGM (§4.2) — the edge structure is compacted to surviving vertices
  once more than ``|E_struct|`` wedges were traversed since the last
  compaction.
* ``⋈_init`` capture — each vertex's support at the instant its range's
  peeling began, used to initialize FD (alg. 3 lines 6-7).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.core import counting
from repro.core.metrics import PhaseMetrics
from repro.core.peel_round import batch_peel_round, compact_edges

#: hard safety bound on CD iterations (a correct run needs far fewer)
MAX_ITERS = 100_000


@dataclass
class CDResult:
    """Output of coarse decomposition.

    ``membership``: pandas ``(u, subset, init_sup)`` — one row per
    peel-side vertex; ``subset`` is 1-based. ``ranges``: the bounds
    ``[θ(1), ..., θ(P'+1)]`` with ``θ(1) = 0`` — subset ``i`` holds tip
    numbers in ``[ranges[i-1], ranges[i])``.
    """

    membership: pd.DataFrame
    ranges: list[int]
    metrics: PhaseMetrics = field(default_factory=PhaseMetrics)
    huc_recounts: int = 0
    dgm_compactions: int = 0


class _CostModel:
    """Driver-side mirror of the edge list for HUC/DGM cost accounting.

    Tracks which peel-side vertices are alive and which edges are still
    present in the *structure* (stale until a DGM/HUC compaction, like
    the paper's CSR). All quantities are exact NumPy reductions over the
    collected edge list — no Spark job.
    """

    def __init__(self, edges_pdf: pd.DataFrame):
        self.eu = edges_pdf["u"].to_numpy()
        self.ev, self._v_ids = pd.factorize(edges_pdf["v"])
        self.alive_edge = np.ones(len(self.eu), dtype=bool)  # u alive
        self.struct_edge = np.ones(len(self.eu), dtype=bool)  # in structure
        self._refresh_struct_degrees()

    def _refresh_struct_degrees(self) -> None:
        n_v = len(self._v_ids)
        self.dv_struct = np.bincount(self.ev[self.struct_edge], minlength=n_v)

    def peel(self, us: pd.Series | np.ndarray) -> None:
        """Mark vertices as peeled (their edges leave the alive graph)."""
        peeled = set(np.asarray(us).tolist())
        mask = pd.Series(self.eu).isin(peeled).to_numpy()
        self.alive_edge &= ~mask

    def compact(self) -> None:
        """Mirror a structure compaction (DGM / HUC re-count)."""
        self.struct_edge = self.alive_edge.copy()
        self._refresh_struct_degrees()

    @property
    def m_struct(self) -> int:
        return int(self.struct_edge.sum())

    def peel_cost(self, us: pd.Series | np.ndarray) -> int:
        """``C_peel = Σ_{u∈S} Σ_{v∈N_u^struct} d_v^struct``."""
        sel = pd.Series(self.eu).isin(set(np.asarray(us).tolist())).to_numpy()
        sel &= self.struct_edge
        return int(self.dv_struct[self.ev[sel]].sum())

    def recount_cost(self) -> int:
        """``C_rcnt = Σ_{(u,v) alive} min(d_u, d_v)`` on the alive graph."""
        eu_a = self.eu[self.alive_edge]
        ev_a = self.ev[self.alive_edge]
        if not len(eu_a):
            return 0
        codes, _ = pd.factorize(eu_a)
        du = np.bincount(codes)
        dv = np.bincount(ev_a, minlength=len(self._v_ids))
        return int(np.minimum(du[codes], dv[ev_a]).sum())


def _find_hi(state_pdf: pd.DataFrame, tgt: float) -> int:
    """Paper's ``findHi``: smallest support whose cumulative wedge count
    reaches ``tgt``, plus one. Falls back to "peel everything" when the
    remaining wedge mass cannot reach the target (incl. the all-zero
    case, where supports can never change again)."""
    hist = (
        state_pdf.groupby("sup", as_index=False)["w0"].sum().sort_values("sup")
    )
    cum = hist["w0"].cumsum()
    reach = cum[cum >= max(tgt, 1)]
    if len(reach):
        return int(hist.loc[reach.index[0], "sup"]) + 1
    return int(hist["sup"].max()) + 1


def receipt_cd(
    edges: DataFrame,
    sup: DataFrame,
    n_partitions: int,
    *,
    huc: bool = True,
    dgm: bool = True,
) -> CDResult:
    """Run coarse decomposition of the ``u`` side of ``edges``.

    ``sup`` is the initial support ``(u, sup)`` from counting (one row
    per peel-side vertex). ``edges`` must already be oriented.
    """
    from repro.graph import bipartite as bg

    spark = edges.sparkSession
    t0 = time.perf_counter()
    edges_cur = edges.select("u", "v").localCheckpoint()
    edges_pdf = edges_cur.toPandas()
    cost = _CostModel(edges_pdf)
    w0 = bg.vertex_wedge_counts(edges).toPandas().rename(columns={"w": "w0"})
    state = sup.toPandas().merge(w0, on="u", how="left")
    state["w0"] = state["w0"].fillna(0).astype("int64")
    state["sup"] = state["sup"].astype("int64")

    res = CDResult(membership=pd.DataFrame(), ranges=[0])
    wedges_since = 0
    lo = 0
    members_acc: list[pd.DataFrame] = []
    s_prev = 1.0
    i = 1
    while i <= n_partitions and len(state):
        total_rem_w = float(state["w0"].sum())
        tgt = s_prev * total_rem_w / (n_partitions - i + 1)
        hi = _find_hi(state, tgt)
        snap = state[["u", "sup"]].rename(columns={"sup": "init_sup"})
        covered_w = 0
        range_members: list[pd.DataFrame] = []
        while True:
            active = state[(state["sup"] >= lo) & (state["sup"] < hi)]
            if active.empty:
                break
            res.metrics.rounds += 1
            if res.metrics.rounds > MAX_ITERS:
                raise RuntimeError("CD iteration bound exceeded — bug")
            covered_w += int(active["w0"].sum())
            range_members.append(active[["u"]])
            remaining = state[~state["u"].isin(active["u"])]
            c_peel = cost.peel_cost(active["u"])
            cost.peel(active["u"])
            use_recount = huc and c_peel > cost.recount_cost()
            if use_recount:
                res.huc_recounts += 1
                if remaining.empty:
                    state = remaining
                    break
                remaining_sdf = spark.createDataFrame(remaining[["u"]])
                edges_cur = compact_edges(edges_cur, remaining_sdf).localCheckpoint()
                cost.compact()
                wedges_since = 0
                bc = counting.per_vertex_butterflies(edges_cur)
                new_sup = bc.u_counts.toPandas().rename(columns={"bcnt": "sup_new"})
                state = remaining.drop(columns=["sup"]).merge(new_sup, "left", on="u")
                state["sup"] = (
                    state["sup_new"].fillna(0).astype("int64").clip(lower=lo)
                )
                state = state[["u", "sup", "w0"]]
                res.metrics.wedges += bc.wedges
            else:
                if remaining.empty:
                    state = remaining
                    res.metrics.wedges += c_peel
                    break
                active_ids = spark.createDataFrame(active[["u"]])
                remaining_sdf = spark.createDataFrame(remaining[["u", "sup", "w0"]])
                state = batch_peel_round(
                    edges_cur, remaining_sdf, active_ids, floor=lo
                ).toPandas()
                res.metrics.wedges += c_peel
                wedges_since += c_peel
                if dgm and wedges_since > cost.m_struct:
                    keep_sdf = spark.createDataFrame(state[["u"]])
                    edges_cur = compact_edges(edges_cur, keep_sdf).localCheckpoint()
                    cost.compact()
                    wedges_since = 0
                    res.dgm_compactions += 1
        if range_members:
            mem = pd.concat(range_members, ignore_index=True).merge(snap, on="u")
            mem["subset"] = i
            members_acc.append(mem)
            s_prev = min(1.0, tgt / covered_w) if covered_w > 0 else 1.0
        else:
            s_prev = 1.0
        res.ranges.append(hi)
        lo = hi
        i += 1
    # leftovers after P ranges form subset P+1 (paper §3.1.1)
    if len(state):
        mem = state.rename(columns={"sup": "init_sup"})[["u", "init_sup"]].copy()
        mem["subset"] = i
        members_acc.append(mem)
        res.ranges.append(int(state["init_sup" if "init_sup" in state else "sup"].max()) + 1)
    membership = (
        pd.concat(members_acc, ignore_index=True)[["u", "init_sup", "subset"]]
        if members_acc
        else pd.DataFrame(columns=["u", "init_sup", "subset"])
    )
    for c in ("u", "init_sup", "subset"):
        membership[c] = membership[c].astype("int64")
    res.membership = membership
    res.metrics.seconds = time.perf_counter() - t0
    return res
