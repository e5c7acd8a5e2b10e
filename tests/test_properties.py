"""Property-based tests (hypothesis) for the pure-numpy substrates."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graphs.edgelist import LocalGraph, canonical_edges
from repro.ppr.exact import ppr_dense
from repro.tasks.metrics import auc_score, micro_macro_f1, precision_at_k

edge_lists = st.lists(
    st.tuples(st.integers(0, 14), st.integers(0, 14)), min_size=0, max_size=60
)


@given(edge_lists, st.booleans())
@settings(max_examples=60, deadline=None)
def test_canonical_edges_idempotent(edges, directed):
    e = np.array(edges, dtype=np.int64).reshape(-1, 2)
    once = canonical_edges(e, 15, directed)
    twice = canonical_edges(once, 15, directed)
    assert np.array_equal(once, twice)
    # no self loops, all in range
    if once.size:
        assert (once[:, 0] != once[:, 1]).all()
        assert once.min() >= 0 and once.max() < 15
        if not directed:
            assert (once[:, 0] < once[:, 1]).all()


@given(edge_lists)
@settings(max_examples=30, deadline=None)
def test_degree_sums_match_arc_count(edges):
    e = np.array(edges, dtype=np.int64).reshape(-1, 2)
    g = LocalGraph.from_edges(e, 15, directed=True)
    assert g.d_out.sum() == g.arcs.shape[0]
    assert g.d_in.sum() == g.arcs.shape[0]


@given(edge_lists)
@settings(max_examples=20, deadline=None)
def test_ppr_row_sums_bounded(edges):
    e = np.array(edges, dtype=np.int64).reshape(-1, 2)
    g = LocalGraph.from_edges(e, 15, directed=True)
    pi = ppr_dense(g, 0.2, iters=120)
    # rows sum to <= 1 (== 1 without reachable dangling nodes), entries >= 0
    assert (pi >= -1e-12).all()
    assert (pi.sum(axis=1) <= 1 + 1e-9).all()


@given(
    st.lists(st.booleans(), min_size=2, max_size=40).filter(
        lambda b: any(b) and not all(b)
    ),
    st.randoms(use_true_random=False),
)
@settings(max_examples=40, deadline=None)
def test_auc_invariant_to_monotone_transform(labels, rnd):
    labels = np.array(labels, dtype=int)
    scores = np.array([rnd.random() for _ in labels])
    a1 = auc_score(labels, scores)
    # x -> 4x is monotone and exact in floats (power-of-two scale), so it
    # preserves ties exactly (exp() would merge near-equal scores)
    a2 = auc_score(labels, 4.0 * scores)
    assert abs(a1 - a2) < 1e-12
    # complement symmetry
    a3 = auc_score(1 - labels, -scores)
    assert abs(a1 - a3) < 1e-12


@given(st.lists(st.booleans(), min_size=1, max_size=50))
@settings(max_examples=40, deadline=None)
def test_precision_at_k_bounds(ranked):
    r = np.array(ranked, dtype=bool)
    out = precision_at_k(r, [1, 3, len(r), len(r) + 10])
    for v in out.values():
        assert 0.0 <= v <= 1.0
    assert out[len(r)] == out[len(r) + 10] == r.mean()


@given(st.lists(st.integers(0, 3), min_size=2, max_size=50))
@settings(max_examples=40, deadline=None)
def test_f1_perfect_prediction_is_one(y):
    y = np.array(y)
    micro, macro = micro_macro_f1(y, y)
    assert micro == 1.0 and macro == 1.0
