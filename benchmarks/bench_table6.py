"""Benchmark for Table VI — end-to-end phases per implementation.

Representative cells (blogcatalog_lite): walk-generation cost of the
three implementations for deepwalk and node2vec, plus the shared
learning phase. ``jobs/table6_end_to_end.py`` prints the full table
across all models and datasets.
"""
import numpy as np
import pytest

from repro.baselines.reference import reference_walks
from repro.datasets import DATASETS, load
from repro.embedding.word2vec import train_embeddings
from repro.bench_utils import paper_budget
from repro.models import make_model
from repro.samplers import make_sampler
from repro.walks.engine import count_walk_tokens, generate_walks

DS = "blogcatalog_lite"
CASES = [
    ("deepwalk", "reference"),
    ("deepwalk", "direct"),
    ("deepwalk", "mh"),
    ("node2vec", "reference"),
    ("node2vec", "alias"),
    ("node2vec", "mh"),
]


@pytest.mark.parametrize("mname,impl", CASES, ids=[f"{m}-{i}" for m, i in CASES])
def test_table6_walk_phase(benchmark, spark, mname, impl):
    g = load(DS)
    model = make_model(mname, p=0.25, q=4.0) if mname == "node2vec" else make_model(mname)

    if impl == "reference":
        def run():
            reference_walks(g, model, model.start_nodes(g),
                            num_walks=2, walk_length=80, seed=0)
    else:
        def run():
            budget = paper_budget(DATASETS[DS], g)
            s = make_sampler(impl, g, model, np.random.default_rng(0), budget)
            s.prepare()
            walks = generate_walks(spark, g, model, num_walks=2,
                                   walk_length=80, prepared=s, seed=0)
            count_walk_tokens(walks)

    benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=0)


def test_table6_learning_phase(benchmark, spark):
    g = load(DS)
    walks = generate_walks(
        spark, g, make_model("deepwalk"), num_walks=2, walk_length=80, seed=0
    ).cache()
    count_walk_tokens(walks)

    benchmark.pedantic(
        lambda: train_embeddings(walks, dim=32, seed=0).count(),
        rounds=2, iterations=1, warmup_rounds=0,
    )
    walks.unpersist()
