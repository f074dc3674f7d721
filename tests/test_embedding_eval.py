"""MLlib Word2Vec wrapper + numpy classification evaluation."""
import numpy as np
import pytest

from repro.embedding.word2vec import (
    train_embeddings,
    vectors_to_numpy,
    walks_as_sentences,
)
from repro.eval import classification as clf
from repro.graph.csr import from_edges
from repro.models import make_model
from repro.synth_data import planted_partition_edges
from repro.walks.engine import generate_walks


# ----------------------------------------------------------------------
# Classification metrics (pure numpy)
# ----------------------------------------------------------------------
def test_f1_perfect_prediction():
    y = np.array([0, 1, 2, 1, 0])
    micro, macro = clf.f1_scores(y, y, 3)
    assert micro == 1.0 and macro == 1.0


def test_f1_manual_case():
    y_true = np.array([0, 0, 1, 1])
    y_pred = np.array([0, 1, 1, 1])
    micro, macro = clf.f1_scores(y_true, y_pred, 2)
    # class0: tp=1 fp=0 fn=1 -> f1=2/3; class1: tp=2 fp=1 fn=0 -> f1=0.8
    assert micro == pytest.approx(0.75)
    assert macro == pytest.approx((2 / 3 + 0.8) / 2)


def test_f1_all_wrong():
    y = np.array([0, 1])
    micro, macro = clf.f1_scores(y, 1 - y, 2)
    assert micro == 0.0 and macro == 0.0


def test_logreg_learns_separable_blobs():
    rng = np.random.default_rng(0)
    X = np.concatenate([rng.normal(-2, 0.5, (200, 4)), rng.normal(2, 0.5, (200, 4))])
    y = np.array([0] * 200 + [1] * 200)
    W = clf.train_logreg_ovr(X, y, 2)
    assert (clf.predict(X, W) == y).mean() > 0.99


def test_evaluate_embeddings_blobs():
    rng = np.random.default_rng(1)
    centers = rng.normal(0, 4, (3, 8))
    labels = rng.integers(0, 3, 600)
    emb = centers[labels] + rng.normal(0, 0.5, (600, 8))
    res = clf.evaluate_embeddings(emb, labels, seed=0)
    assert res.micro_f1 > 0.95 and res.macro_f1 > 0.95


def test_evaluate_embeddings_random_features_chance():
    rng = np.random.default_rng(2)
    emb = rng.normal(0, 1, (400, 8))
    labels = rng.integers(0, 4, 400)
    res = clf.evaluate_embeddings(emb, labels, seed=0)
    assert res.micro_f1 < 0.45  # near chance (0.25) with slack


# ----------------------------------------------------------------------
# Word2Vec wrapper
# ----------------------------------------------------------------------
@pytest.fixture(scope="module")
def pp_graph():
    src, dst, w, labels = planted_partition_edges(
        n=300, n_communities=3, avg_degree=14, p_in=0.9, seed=4
    )
    return from_edges(src, dst, w, n=300), labels


def test_walks_as_sentences(spark, pp_graph):
    g, _ = pp_graph
    walks = generate_walks(
        spark, g, make_model("deepwalk"), num_walks=1, walk_length=5, seed=0
    )
    sents = walks_as_sentences(walks)
    row = sents.first()
    assert isinstance(row["sentence"][0], str)


def test_word2vec_shapes_and_vocab(spark, pp_graph):
    g, _ = pp_graph
    walks = generate_walks(
        spark, g, make_model("deepwalk"), num_walks=4, walk_length=20, seed=0
    )
    vec = train_embeddings(walks, dim=16, seed=0)
    emb = vectors_to_numpy(vec, g.n)
    assert emb.shape == (g.n, 16)
    # Every non-isolated node gets a non-zero vector.
    nz = (np.abs(emb).sum(axis=1) > 0)
    assert nz[g.degrees > 0].mean() > 0.99


def test_end_to_end_classification_beats_chance(spark, pp_graph):
    """The full pipeline (M-H walks -> word2vec -> logistic regression)
    recovers planted communities far above chance (Fig. 5 protocol)."""
    g, labels = pp_graph
    walks = generate_walks(
        spark, g, make_model("deepwalk"), num_walks=8, walk_length=30, seed=1
    )
    emb = vectors_to_numpy(train_embeddings(walks, dim=32, seed=1), g.n)
    res = clf.evaluate_embeddings(emb, labels, seed=1)
    assert res.micro_f1 > 0.8
