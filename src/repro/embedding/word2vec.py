"""Embedding learning: walks → vectors via MLlib Word2Vec.

The paper's learning phase feeds the random walk corpus to a word2vec
model (skip-gram). The Spark-native equivalent is
``pyspark.ml.feature.Word2Vec``; its cost is the ``T_l`` column of
Table VI (the paper treats this phase as out-of-contribution, §I fn.1).
"""
from __future__ import annotations

from pyspark.ml.feature import Word2Vec
from pyspark.sql import DataFrame, functions as F


def walks_as_sentences(walks_df: DataFrame) -> DataFrame:
    """``(walk_id, walk array<long>)`` → ``(sentence array<string>)``
    — MLlib Word2Vec tokenizes over strings."""
    return walks_df.select(
        F.transform(F.col("walk"), lambda x: x.cast("string")).alias("sentence")
    ).where(F.size("sentence") > 1)


def train_embeddings(
    walks_df: DataFrame,
    *,
    dim: int = 64,
    window: int = 5,
    min_count: int = 0,
    max_iter: int = 1,
    seed: int = 0,
    num_partitions: int = 16,
) -> DataFrame:
    """Train and return per-node vectors ``(word string, vector)``."""
    sents = walks_as_sentences(walks_df)
    w2v = Word2Vec(
        vectorSize=dim,
        windowSize=window,
        minCount=min_count,
        maxIter=max_iter,
        seed=seed,
        numPartitions=num_partitions,
        inputCol="sentence",
        outputCol="w2v",
    )
    model = w2v.fit(sents)
    return model.getVectors()


def vectors_to_numpy(vectors_df: DataFrame, n: int):
    """Dense ``float64[n, dim]`` matrix (rows for unseen nodes are 0)."""
    import numpy as np

    rows = vectors_df.collect()
    dim = len(rows[0]["vector"]) if rows else 0
    out = np.zeros((n, dim), dtype=np.float64)
    for r in rows:
        i = int(r["word"])
        if 0 <= i < n:
            out[i] = np.asarray(r["vector"])
    return out
