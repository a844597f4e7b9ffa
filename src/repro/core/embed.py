"""Embedding generation (paper §IV-A): Word2Vec over walk sentences.

The paper trains gensim Word2Vec (skip-gram window 3 for text-to-data, CBOW
window 15 for text-only tasks). Spark ML ships skip-gram only; we use
skip-gram for all tasks and keep the paper's window sizes — documented
deviation (the paper reports graph-embedding alternatives comparable in
quality, so the training objective is not load-bearing).

Embeddings are returned as a DataFrame(node, vector: array<float>) so every
downstream consumer (matching, merging calibration) stays in DataFrame land.
"""
from __future__ import annotations

from pyspark.ml.feature import Word2Vec
from pyspark.ml.functions import vector_to_array
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def train_embeddings(
    walks: DataFrame,
    *,
    vector_size: int = 64,
    window: int = 3,
    min_count: int = 1,
    seed: int = 0,
    max_iter: int = 1,
) -> DataFrame:
    """Train Word2Vec on walk sentences -> DataFrame(node, vector).

    ``walks`` must have a column ``walk: array<string>``.
    """
    w2v = Word2Vec(
        vectorSize=vector_size,
        windowSize=window,
        minCount=min_count,
        seed=seed,
        maxIter=max_iter,
        inputCol="walk",
        outputCol="_v",
    )
    model = w2v.fit(walks)
    return model.getVectors().select(
        F.col("word").alias("node"), vector_to_array("vector").alias("vector")
    )


def train_token_embeddings(
    sentences: DataFrame,
    *,
    tokens_col: str = "tokens",
    vector_size: int = 64,
    window: int = 5,
    min_count: int = 1,
    seed: int = 0,
    max_iter: int = 1,
) -> DataFrame:
    """Word2Vec over plain token sentences (baselines / background model).

    Returns DataFrame(word, vector: array<float>).
    """
    w2v = Word2Vec(
        vectorSize=vector_size,
        windowSize=window,
        minCount=min_count,
        seed=seed,
        maxIter=max_iter,
        inputCol=tokens_col,
        outputCol="_v",
    )
    model = w2v.fit(sentences)
    return model.getVectors().select(
        "word", vector_to_array("vector").alias("vector")
    )


def mean_pool(doc_tokens: DataFrame, word_vectors: DataFrame, *, id_col: str = "doc") -> DataFrame:
    """Document embedding = mean of in-vocabulary token vectors [38].

    ``doc_tokens``: DataFrame(id_col, token). ``word_vectors``: DataFrame
    (word, vector). Documents with no in-vocabulary token are dropped
    (callers treat them as unmatched).
    """
    joined = doc_tokens.join(
        word_vectors.withColumnRenamed("word", "token"), "token"
    )
    return (
        joined.groupBy(id_col)
        .agg(F.collect_list("vector").alias("_vs"))
        .select(
            id_col,
            F.expr(
                "transform(sequence(0, size(_vs[0]) - 1), "
                "i -> aggregate(_vs, cast(0.0 as double), (acc, v) -> acc + v[i]) / size(_vs))"
            ).alias("vector"),
        )
    )
