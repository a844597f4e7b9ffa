"""W2VEC baseline (paper §V, "training-based"): Word2Vec trained on the
task's own documents (both corpora serialized to sentences), documents
embedded as the mean of their token vectors, matched by cosine top-k.

This is the paper's weakest trained baseline: serialization loses the
structural dependencies the graph keeps (§IV-A discussion), which is why
its results are poor on text-to-data tasks.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from ..core.embed import train_token_embeddings
from ..core.match import top_k_matches
from .common import doc_tokens, text_view
from .pretrained import doc_embeddings


def w2vec_match(
    spark: SparkSession,
    query_corpus,
    target_corpus,
    *,
    k: int = 20,
    vector_size: int = 64,
    window: int = 5,
    seed: int = 0,
) -> DataFrame:
    """Train-on-task Word2Vec matcher -> (query, target, score, rank)."""
    qv, tv = text_view(query_corpus), text_view(target_corpus)
    corpus = doc_tokens(qv).select("tokens").unionByName(doc_tokens(tv).select("tokens"))
    wv = train_token_embeddings(
        corpus, vector_size=vector_size, window=window, min_count=1, seed=seed
    ).cache()
    q = doc_embeddings(qv, wv).withColumnRenamed("doc", "node")
    t = doc_embeddings(tv, wv).withColumnRenamed("doc", "node")
    return top_k_matches(q, t, k=k)
