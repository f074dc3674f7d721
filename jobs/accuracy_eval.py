"""Accuracy evaluation (paper §V-B / Fig. 5 protocol, numeric form).

Figures are out of scope for this reproduction, but Fig. 5's protocol —
multi-label node classification over embeddings from deepwalk /
node2vec (three init strategies) / metapath2vec — is reproduced here
numerically on a planted-partition graph, where ground-truth community
labels play the role of the datasets' node labels. The expected shape:
all UniNet variants reach comparable F1, with high-weight >= random
for node2vec's skewed distributions (Theorem 3).

Run: ``python jobs/accuracy_eval.py``.
"""
from __future__ import annotations

import numpy as np

from repro.bench_utils import print_table
from repro.embedding.word2vec import train_embeddings, vectors_to_numpy
from repro.eval.classification import evaluate_embeddings
from repro.graph.csr import from_edges
from repro.models import make_model
from repro.synth_data import node_types, planted_partition_edges
from repro.walks.engine import generate_walks

CONFIGS = [
    ("deepwalk", "mh-random", {}),
    ("node2vec", "mh-random", dict(p=0.25, q=4.0)),
    ("node2vec", "mh-weight", dict(p=0.25, q=4.0)),
    ("node2vec", "mh-burn", dict(p=0.25, q=4.0)),
    ("node2vec", "alias", dict(p=0.25, q=4.0)),  # "original" sampling
    ("metapath2vec", "mh-random", {}),
]


def build_graph(n=1500, n_communities=5, seed=9):
    src, dst, w, labels = planted_partition_edges(
        n=n, n_communities=n_communities, avg_degree=20, p_in=0.85, seed=seed
    )
    nt = node_types(n=n, n_types=3, seed=seed)
    g = from_edges(src, dst, w, n=n, node_type=nt)
    return g, labels


def main(spark=None):
    own = spark is None
    if own:
        from repro.bench_utils import get_or_create_spark

        spark = get_or_create_spark("accuracy")
        spark.sparkContext.setLogLevel("ERROR")
    g, labels = build_graph()
    rows = []
    for model_name, sampler, kw in CONFIGS:
        model = make_model(model_name, **kw)
        walks = generate_walks(
            spark, g, model, num_walks=10, walk_length=40,
            sampler=sampler, seed=7,
        )
        emb = vectors_to_numpy(
            train_embeddings(walks, dim=48, window=5, max_iter=2, seed=7), g.n
        )
        res = evaluate_embeddings(emb, labels, seed=7)
        rows.append([f"{model_name}+{sampler}", res.micro_f1, res.macro_f1])
        print("  done:", model_name, sampler, flush=True)
    print_table(
        "Accuracy (Fig. 5 protocol on planted partition): Micro/Macro-F1",
        ["config", "micro_f1", "macro_f1"],
        rows,
    )
    if own:
        spark.stop()
    return rows


if __name__ == "__main__":
    main()
