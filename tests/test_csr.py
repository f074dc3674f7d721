"""CSRGraph substrate invariants and lookups vs brute force."""
import numpy as np
import pytest

from repro.graph.csr import from_edges
from repro.synth_data import chung_lu_edges, node_types

from tests.util import small_graph


@pytest.fixture(scope="module")
def g():
    return small_graph()


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
@pytest.mark.parametrize("n,deg", [(50, 4), (120, 10), (300, 25)])
def test_from_edges_invariants(seed, n, deg):
    src, dst, w = chung_lu_edges(n=n, avg_degree=deg, seed=seed, weighted=True)
    g = from_edges(src, dst, w, n=n)
    # Offsets monotone, cover all slots.
    assert g.indptr[0] == 0 and g.indptr[-1] == g.m
    assert (np.diff(g.indptr) >= 0).all()
    # Sorted adjacency per node, no self loops, no duplicates.
    for v in range(0, n, max(1, n // 17)):
        nb = g.neighbors(v)
        assert (np.diff(nb) > 0).all()
        assert v not in nb
    # Symmetry: (u,v) present iff (v,u) present.
    assert g.has_edge(g.indices.astype(np.int64), g.src).all()


def test_symmetrize_doubles_weighted_edges():
    g = from_edges(np.array([0, 1]), np.array([1, 2]), np.array([2.0, 3.0]), n=3)
    assert g.m == 4
    assert g.weights[int(g.edge_index(np.array([1]), np.array([0]))[0])] == 2.0
    assert g.weights[int(g.edge_index(np.array([2]), np.array([1]))[0])] == 3.0


def test_self_loops_dropped():
    g = from_edges(np.array([0, 1, 2]), np.array([0, 2, 2]), n=3)
    assert g.m == 2  # only 1-2 symmetrized


def test_duplicate_edges_collapse_min_weight():
    g = from_edges(
        np.array([0, 0, 1]), np.array([1, 1, 0]), np.array([5.0, 2.0, 7.0]), n=2
    )
    assert g.m == 2
    assert (g.weights == 2.0).all()


def test_edge_index_vs_bruteforce(g):
    rng = np.random.default_rng(0)
    us = rng.integers(0, g.n, 500)
    vs = rng.integers(0, g.n, 500)
    got = g.edge_index(us, vs)
    for u, v, e in zip(us, vs, got):
        nb = g.neighbors(int(u))
        if int(v) in nb:
            assert g.src[e] == u and g.indices[e] == v
        else:
            assert e == -1


def test_has_edge_matches_edge_index(g):
    rng = np.random.default_rng(1)
    us = rng.integers(0, g.n, 300)
    vs = rng.integers(0, g.n, 300)
    assert (g.has_edge(us, vs) == (g.edge_index(us, vs) >= 0)).all()


def test_has_edge_handles_negative_prev(g):
    # prev = -1 before the second step must simply report "no edge".
    assert not g.has_edge(np.array([0]), np.array([-1]))[0]
    assert not g.has_edge(np.array([-1]), np.array([0]))[0]


def test_degree_vectorized(g):
    vs = np.arange(g.n)
    assert (g.degree(vs) == np.diff(g.indptr)).all()


def test_type_count_bruteforce(g):
    tc = g.type_count()
    for v in range(0, g.n, 13):
        nb = g.neighbors(v)
        for t in range(g.n_types):
            assert tc[v, t] == int((g.node_type[nb] == t).sum())


def test_attr_count_bruteforce(g):
    ac = g.attr_count()
    for v in range(0, g.n, 17):
        nb = g.neighbors(v)
        for t in range(g.n_attrs):
            assert ac[v, t] == int((g.node_attr[nb] == t).sum())


def test_weight_sums_bruteforce(g):
    ws = g.weight_sums()
    for v in range(0, g.n, 11):
        np.testing.assert_allclose(ws[v], g.neighbor_weights(v).sum())


def test_edge_type_symmetric(g):
    et = g.edge_type()
    rev = g.edge_index(g.indices.astype(np.int64), g.src)
    assert (et == et[rev]).all()
    assert g.n_edge_types <= g.n_types * (g.n_types + 1) // 2


def test_edge_type_determined_by_endpoint_types(g):
    et = g.edge_type()
    tu = g.node_type[g.src]
    tv = g.node_type[g.indices]
    key = np.minimum(tu, tv) * 100 + np.maximum(tu, tv)
    # Same unordered type pair -> same edge type.
    for pair in np.unique(key):
        assert len(np.unique(et[key == pair])) == 1


def test_caches_are_stable(g):
    assert g.type_count() is g.type_count()
    assert g.weight_sums() is g.weight_sums()
    assert g.edge_type() is g.edge_type()


def test_nbytes_positive(g):
    assert g.nbytes() > 0


def test_homogeneous_defaults():
    g = from_edges(np.array([0, 1]), np.array([1, 2]), n=3)
    assert g.n_types == 1 and (g.node_type == 0).all()
    assert (g.weights == 1.0).all()


def test_node_attr_defaults_to_type():
    nt = node_types(n=10, n_types=3, seed=0)
    g = from_edges(np.array([0, 5]), np.array([1, 6]), n=10, node_type=nt)
    assert (g.node_attr == nt).all()


def test_pickle_roundtrip(g):
    import pickle

    g2 = pickle.loads(pickle.dumps(g))
    assert g2.n == g.n and g2.m == g.m
    assert (g2.indices == g.indices).all()
    assert (g2.comp_key == g.comp_key).all()
