"""Naive reference ("open-sourced version") baseline."""
import numpy as np
import pytest

from repro.baselines.reference import reference_walks
from repro.core.theory import exact_transition, tv_distance
from repro.models import make_model
from repro.walks.kernel import walk_lengths

from tests.util import small_graph


@pytest.fixture(scope="module")
def g():
    return small_graph(n=120, avg_degree=8, seed=6)


@pytest.mark.parametrize(
    "mname,kw",
    [
        ("deepwalk", {}),
        ("node2vec", dict(p=0.25, q=4.0)),
        ("metapath2vec", {}),
        ("edge2vec", {}),
        ("fairwalk", {}),
    ],
)
def test_reference_walks_valid(g, mname, kw):
    model = make_model(mname, **kw)
    res = reference_walks(
        g, model, model.start_nodes(g)[:20], num_walks=2, walk_length=10, seed=0
    )
    assert not res.timed_out
    assert res.init_s >= 0 and res.walk_s >= 0
    lens = walk_lengths(res.walks)
    for row, ln in zip(res.walks, lens):
        for a, b in zip(row[: ln - 1], row[1:ln]):
            assert g.has_edge(np.array([a]), np.array([b]))[0]


def test_reference_node2vec_precompute_is_costly_and_correct(g):
    """The node2vec reference precomputes |E| state tables (big init)
    and still samples the exact second-order distribution."""
    model = make_model("node2vec", p=0.25, q=4.0)
    v = int(np.argmax(g.degrees))
    prev = int(g.neighbors(v)[0])
    res = reference_walks(
        g, model, np.array([prev]), num_walks=400, walk_length=2, seed=1
    )
    dw = reference_walks(
        g, make_model("deepwalk"), np.array([prev]), num_walks=5,
        walk_length=2, seed=1,
    )
    assert res.init_s > 10 * max(dw.init_s, 1e-9)
    # Transitions v -> ? given prev: collect second steps where step1==v.
    counts = np.zeros(int(g.degrees[v]))
    nb = g.neighbors(v)
    tot = 0
    for row in res.walks:
        if row[1] == v and row[2] >= 0:
            counts[int(np.where(nb == row[2])[0][0])] += 1
            tot += 1
    if tot > 100:
        pi = exact_transition(g, model, v, prev)
        assert tv_distance(pi, counts / counts.sum()) < 0.25


def test_reference_timeout_returns_flag(g):
    model = make_model("node2vec")
    res = reference_walks(
        g, model, np.arange(50), num_walks=50, walk_length=80, seed=0,
        time_limit_s=0.0,
    )
    assert res.timed_out
    assert res.walks is None


def test_reference_deterministic(g):
    model = make_model("deepwalk")
    a = reference_walks(g, model, np.arange(10), num_walks=1, walk_length=8, seed=3)
    b = reference_walks(g, model, np.arange(10), num_walks=1, walk_length=8, seed=3)
    assert (a.walks == b.walks).all()


def test_reference_metapath_respects_types(g):
    model = make_model("metapath2vec", metapath=[0, 1, 0])
    starts = model.start_nodes(g)[:15]
    res = reference_walks(g, model, starts, num_walks=1, walk_length=8, seed=2)
    lens = walk_lengths(res.walks)
    for row, ln in zip(res.walks, lens):
        for pos in range(ln):
            assert g.node_type[row[pos]] == [0, 1][pos % 2]
