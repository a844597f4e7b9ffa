"""Supervised matcher baselines: DITTO*, DEEP-M*, TAPAS*, L-BE*.

All are substitutes for fine-tuned transformers (DESIGN.md §4) built on the
shared ``kfold_rank`` harness with baseline-specific feature families:

* **DITTO*** — entity matcher over ``[COL]/[VAL]``-serialized pairs; purely
  lexical pair features (the serialized-text signal Ditto consumes).
* **DEEP-M*** — DeepMatcher-style: features from embeddings *trained on the
  task corpora* (its RNN/attention summarizers are fed fastText trained
  in-domain) plus overlap.
* **TAPAS*** — table-pre-trained: features from the *general background*
  embeddings over (sentence, serialized row) — pre-trained on generic
  corpora, fine-tuned on the 60% labels; inherits domain-vocabulary
  blindness, the failure the paper reports.
* **L-BE*** — BERT-large fine-tuned for multi-label classification
  (Audit task): a trained Rocchio/centroid multi-label classifier over
  TF-IDF — supervised, strongest at K=1, degrades for documents with many
  labels (the paper's observed shape).
"""
from __future__ import annotations

import math
from collections import Counter
from typing import Dict, List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.embed import train_token_embeddings
from .common import doc_tokens, text_view
from .features import PairFeaturizer
from .pretrained import background_model
from .rank import kfold_rank


def ditto_match(
    spark: SparkSession, query_corpus, target_corpus, truth: DataFrame,
    *, k: int = 20, seed: int = 0, n_folds: int = 5,
) -> DataFrame:
    fz = PairFeaturizer(
        spark, query_corpus, target_corpus,
        features=["tfidf_cos", "jaccard", "rare", "num_match"],
    )
    return kfold_rank(spark, fz, truth, k=k, seed=seed, n_folds=n_folds)


def deepmatcher_match(
    spark: SparkSession, query_corpus, target_corpus, truth: DataFrame,
    *, k: int = 20, seed: int = 0, n_folds: int = 5, vector_size: int = 64,
) -> DataFrame:
    qv, tv = text_view(query_corpus), text_view(target_corpus)
    corpus = doc_tokens(qv).select("tokens").unionByName(doc_tokens(tv).select("tokens"))
    own = train_token_embeddings(
        corpus, vector_size=vector_size, window=5, min_count=1, seed=seed
    )
    fz = PairFeaturizer(
        spark, query_corpus, target_corpus,
        features=["own_cos", "jaccard", "overlap"], own_vectors=own,
    )
    return kfold_rank(spark, fz, truth, k=k, seed=seed, n_folds=n_folds)


def tapas_match(
    spark: SparkSession, query_corpus, target_corpus, truth: DataFrame,
    *, k: int = 20, seed: int = 0, n_folds: int = 5,
) -> DataFrame:
    bg = background_model(spark, seed=seed)
    fz = PairFeaturizer(
        spark, query_corpus, target_corpus,
        features=["bg_cos", "overlap", "num_match"], bg_vectors=bg,
    )
    return kfold_rank(spark, fz, truth, k=k, seed=seed, n_folds=n_folds)


# ---------------------------------------------------------------------------
# L-BE*: supervised multi-label document -> concept classifier (Table III)
# ---------------------------------------------------------------------------


def _tfidf_matrix(tokens_by_doc: Dict[str, List[str]]):
    vocab: Dict[str, int] = {}
    for toks in tokens_by_doc.values():
        for t in toks:
            vocab.setdefault(t, len(vocab))
    n_docs = len(tokens_by_doc)
    df = Counter()
    for toks in tokens_by_doc.values():
        df.update(set(toks))
    idf = np.zeros(len(vocab))
    for w, i in vocab.items():
        idf[i] = math.log((1 + n_docs) / (1 + df[w])) + 1
    mat = np.zeros((n_docs, len(vocab)))
    ids = list(tokens_by_doc)
    for r, d in enumerate(ids):
        tf = Counter(tokens_by_doc[d])
        for w, c in tf.items():
            mat[r, vocab[w]] = c * idf[vocab[w]]
        norm = np.linalg.norm(mat[r])
        if norm > 0:
            mat[r] /= norm
    return ids, vocab, idf, mat


def lbe_match(
    spark: SparkSession, docs_corpus, taxonomy_corpus, truth: DataFrame,
    *, k: int = 10, n_folds: int = 5, seed: int = 0, label_weight: float = 0.5,
) -> DataFrame:
    """L-BE* substitute: cross-validated centroid (Rocchio) multi-label
    classifier. Concept score = cosine(doc, centroid of the concept's
    training documents blended with the concept's own label vector)."""
    from ..core.preprocess import content_tokens

    docs_pdf = text_view(docs_corpus).toPandas()
    tax_pdf = taxonomy_corpus.df.select(
        F.col(taxonomy_corpus.id_col).cast("string").alias("doc"),
        F.col(taxonomy_corpus.text_col).alias("text"),
    ).toPandas()
    doc_toks = {str(d): content_tokens(t or "") for d, t in zip(docs_pdf["doc"], docs_pdf["text"])}
    all_toks = dict(doc_toks)
    for d, t in zip(tax_pdf["doc"], tax_pdf["text"]):
        all_toks["concept::" + str(d)] = content_tokens(t or "")
    ids, vocab, idf, mat = _tfidf_matrix(all_toks)
    row_of = {d: i for i, d in enumerate(ids)}

    truth_pdf = truth.select(
        F.col("query").cast("string"), F.col("target").cast("string")
    ).toPandas()
    labels_of = truth_pdf.groupby("query")["target"].apply(list).to_dict()
    queries = sorted(q for q in labels_of if q in doc_toks)
    concepts = [str(c) for c in tax_pdf["doc"]]

    rng = np.random.default_rng(seed)
    order = list(rng.permutation(queries))
    folds = [order[i::n_folds] for i in range(n_folds)]

    rows = []
    for fi, test_q in enumerate(folds):
        train_q = [q for q in queries if q not in set(test_q)]
        centroids = np.zeros((len(concepts), mat.shape[1]))
        for ci, c in enumerate(concepts):
            members = [row_of[q] for q in train_q if c in set(labels_of.get(q, []))]
            v = mat[members].mean(axis=0) if members else np.zeros(mat.shape[1])
            v = (1 - label_weight) * v + label_weight * mat[row_of["concept::" + c]]
            n = np.linalg.norm(v)
            centroids[ci] = v / n if n > 0 else v
        for q in test_q:
            scores = centroids @ mat[row_of[q]]
            top = np.lexsort((np.array(concepts, dtype=object), -scores))[:k]
            for r, ci in enumerate(top, start=1):
                rows.append((q, concepts[ci], float(scores[ci]), r))
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["query", "target", "score", "rank"])
    )
