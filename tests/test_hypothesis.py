"""Property-based tests on random bipartite graphs (NumPy substrate —
fast enough for dozens of generated examples per property)."""
import numpy as np
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.bup import bup, bup_bruteforce, edges_to_numpy, parb_simulate
from repro.core.kernel import count_butterflies_np, peel

from .conftest import assert_tips_equal, brute_force_vertex_butterflies


@st.composite
def edge_lists(draw, max_u=12, max_v=12, max_m=40):
    n_u = draw(st.integers(1, max_u))
    n_v = draw(st.integers(1, max_v))
    pairs = draw(
        st.sets(
            st.tuples(st.integers(0, n_u - 1), st.integers(0, n_v - 1)),
            min_size=1,
            max_size=max_m,
        )
    )
    pdf = pd.DataFrame(sorted(pairs), columns=["u", "v"]).astype("int64")
    return pdf


@settings(max_examples=40, deadline=None)
@given(edge_lists())
def test_counting_matches_bruteforce(pdf):
    n_u, n_v, eu, ev, u_ids, v_ids = edges_to_numpy(pdf)
    bu, bv, total, _ = count_butterflies_np(n_u, n_v, eu, ev)
    ref_u, ref_v, ref_total = brute_force_vertex_butterflies(pdf)
    assert total == ref_total
    assert all(bu[i] == ref_u[uid] for i, uid in enumerate(u_ids))
    assert all(bv[i] == ref_v[vid] for i, vid in enumerate(v_ids))


@settings(max_examples=30, deadline=None)
@given(edge_lists())
def test_bup_matches_bruteforce_decomposition(pdf):
    assert_tips_equal(bup_bruteforce(pdf), bup(pdf)[0])


@settings(max_examples=30, deadline=None)
@given(edge_lists())
def test_parb_equals_bup(pdf):
    assert_tips_equal(bup(pdf)[0], parb_simulate(pdf)[0])


@settings(max_examples=30, deadline=None)
@given(edge_lists())
def test_dgm_invariance(pdf):
    n_u, n_v, eu, ev, _, _ = edges_to_numpy(pdf)
    sup0, _, _, _ = count_butterflies_np(n_u, n_v, eu, ev)
    t0, s0 = peel(n_u, n_v, eu, ev, sup0, batch=False, dgm=False)
    t1, s1 = peel(n_u, n_v, eu, ev, sup0, batch=False, dgm=True)
    assert (t0 == t1).all()
    assert s1.wedges <= s0.wedges


@settings(max_examples=30, deadline=None)
@given(edge_lists())
def test_tip_bounded_by_initial_support(pdf):
    """θ_u <= ⋈_u(G): a vertex can never out-tip its butterfly count."""
    n_u, n_v, eu, ev, u_ids, _ = edges_to_numpy(pdf)
    sup0, _, _, _ = count_butterflies_np(n_u, n_v, eu, ev)
    tips, _ = peel(n_u, n_v, eu, ev, sup0, batch=False)
    assert (tips <= sup0).all()
    assert (tips >= 0).all()


@settings(max_examples=20, deadline=None)
@given(edge_lists(), st.integers(0, 3))
def test_support_floor_monotone_under_edge_removal(pdf, k):
    """Removing k edges never increases any butterfly count."""
    n_u, n_v, eu, ev, u_ids, _ = edges_to_numpy(pdf)
    bu0, _, t0, _ = count_butterflies_np(n_u, n_v, eu, ev)
    keep = np.ones(len(eu), dtype=bool)
    keep[: min(k, len(eu))] = False
    if keep.sum() == 0:
        return
    bu1, _, t1, _ = count_butterflies_np(n_u, n_v, eu[keep], ev[keep])
    assert t1 <= t0
    assert (bu1 <= bu0).all()
