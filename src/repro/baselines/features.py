"""Pair-feature computation shared by the supervised baselines.

Supervised baselines score (query document, target document) pairs. Features
are computed distributedly: the target corpus' TF-IDF matrix / embedding
matrix / token sets are broadcast, and ``mapInPandas`` over the pair
DataFrame evaluates the feature vector per pair (same layering pattern as
``core.match``).

Feature families (which baseline uses which is declared in rank.py /
matchers.py):

* ``tfidf_cos`` — cosine over corpus-fit TF-IDF vectors (lexical signal)
* ``jaccard``   — token-set Jaccard
* ``overlap``   — |shared tokens| / |query tokens|
* ``rare``      — number of shared low-DF tokens (strong lexical anchors)
* ``num_match`` — fraction of the query's numeric tokens found in the target
* ``bg_cos``    — cosine of mean-pooled *background* (pre-trained) embeddings
* ``own_cos``   — cosine of mean-pooled *trained-on-task* embeddings
"""
from __future__ import annotations

import math
from collections import Counter
from typing import Dict, Iterable, List, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.preprocess import content_tokens, is_numeric
from .common import text_view

ALL_FEATURES = ("tfidf_cos", "jaccard", "overlap", "rare", "num_match", "bg_cos", "own_cos")


def _tokens_map(view_pdf: pd.DataFrame) -> Dict[str, List[str]]:
    return {
        str(d): content_tokens(t or "") for d, t in zip(view_pdf["doc"], view_pdf["text"])
    }


def _tfidf(
    q_tokens: Dict[str, List[str]], t_tokens: Dict[str, List[str]]
) -> Tuple[Dict[str, Dict[str, float]], Dict[str, Dict[str, float]], Dict[str, float]]:
    """Fit IDF on the union corpus, return per-doc L2-normalized tf-idf."""
    df_counts: Counter = Counter()
    n_docs = 0
    for toks in list(q_tokens.values()) + list(t_tokens.values()):
        n_docs += 1
        df_counts.update(set(toks))
    idf = {w: math.log((1 + n_docs) / (1 + c)) + 1 for w, c in df_counts.items()}

    def vecs(tok_map: Dict[str, List[str]]) -> Dict[str, Dict[str, float]]:
        out = {}
        for d, toks in tok_map.items():
            tf = Counter(toks)
            v = {w: tf[w] * idf[w] for w in tf}
            norm = math.sqrt(sum(x * x for x in v.values())) or 1.0
            out[d] = {w: x / norm for w, x in v.items()}
        return out

    return vecs(q_tokens), vecs(t_tokens), idf


def _mean_vec(tokens: List[str], wv: Dict[str, np.ndarray], dim: int) -> np.ndarray:
    vs = [wv[t] for t in tokens if t in wv]
    if not vs:
        return np.zeros(dim)
    v = np.mean(vs, axis=0)
    n = np.linalg.norm(v)
    return v / n if n > 0 else v


class PairFeaturizer:
    """Precomputes broadcastable state, then featurizes pair DataFrames."""

    def __init__(
        self,
        spark: SparkSession,
        query_corpus,
        target_corpus,
        *,
        features: Sequence[str],
        bg_vectors: DataFrame = None,
        own_vectors: DataFrame = None,
        rare_df_max: int = 3,
    ):
        for f in features:
            if f not in ALL_FEATURES:
                raise ValueError(f"unknown feature {f!r}")
        self.features = tuple(features)
        self.spark = spark
        q_pdf = text_view(query_corpus).toPandas()
        t_pdf = text_view(target_corpus).toPandas()
        self.q_tokens = _tokens_map(q_pdf)
        self.t_tokens = _tokens_map(t_pdf)
        self.q_tfidf, self.t_tfidf, idf = _tfidf(self.q_tokens, self.t_tokens)
        dfc: Counter = Counter()
        for toks in list(self.q_tokens.values()) + list(self.t_tokens.values()):
            dfc.update(set(toks))
        self.rare_words = {w for w, c in dfc.items() if c <= rare_df_max}

        def _wv_dict(df: DataFrame):
            if df is None:
                return None, 0
            pdf = df.toPandas()
            d = {w: np.asarray(v, dtype=float) for w, v in zip(pdf["word"], pdf["vector"])}
            dim = len(next(iter(d.values()))) if d else 0
            return d, dim

        self.bg_wv, self.bg_dim = _wv_dict(bg_vectors)
        self.own_wv, self.own_dim = _wv_dict(own_vectors)

        self._b = spark.sparkContext.broadcast(
            {
                "features": self.features,
                "q_tokens": self.q_tokens,
                "t_tokens": self.t_tokens,
                "q_tfidf": self.q_tfidf,
                "t_tfidf": self.t_tfidf,
                "rare": self.rare_words,
                "bg_wv": self.bg_wv,
                "bg_dim": self.bg_dim,
                "own_wv": self.own_wv,
                "own_dim": self.own_dim,
            }
        )

    def all_pairs(self) -> DataFrame:
        """Cross product of query × target ids as a DataFrame."""
        q = self.spark.createDataFrame(pd.DataFrame({"query": list(self.q_tokens)}))
        t = self.spark.createDataFrame(pd.DataFrame({"target": list(self.t_tokens)}))
        return q.crossJoin(t)

    def featurize(self, pairs: DataFrame) -> DataFrame:
        """(query, target [, label]) -> + feature columns (array<double>)."""
        b = self._b
        feats = self.features
        has_label = "label" in pairs.columns
        schema = "query string, target string" + (", label double" if has_label else "") + ", features array<double>"

        def gen(batches: Iterable[pd.DataFrame]):
            s = b.value
            for pdf in batches:
                rows = []
                labels = pdf["label"] if has_label else [None] * len(pdf)
                for q, t, lab in zip(pdf["query"], pdf["target"], labels):
                    q, t = str(q), str(t)
                    qt, tt = s["q_tokens"].get(q, []), s["t_tokens"].get(t, [])
                    qs, ts = set(qt), set(tt)
                    shared = qs & ts
                    fv = []
                    for f in feats:
                        if f == "tfidf_cos":
                            va, vb = s["q_tfidf"].get(q, {}), s["t_tfidf"].get(t, {})
                            small, big = (va, vb) if len(va) < len(vb) else (vb, va)
                            fv.append(sum(x * big.get(w, 0.0) for w, x in small.items()))
                        elif f == "jaccard":
                            fv.append(len(shared) / len(qs | ts) if qs or ts else 0.0)
                        elif f == "overlap":
                            fv.append(len(shared) / len(qs) if qs else 0.0)
                        elif f == "rare":
                            fv.append(float(len(shared & s["rare"])))
                        elif f == "num_match":
                            qn = {w for w in qs if is_numeric(w)}
                            fv.append(len(qn & ts) / len(qn) if qn else 0.0)
                        elif f == "bg_cos":
                            fv.append(
                                float(
                                    _mean_vec(qt, s["bg_wv"], s["bg_dim"])
                                    @ _mean_vec(tt, s["bg_wv"], s["bg_dim"])
                                )
                            )
                        elif f == "own_cos":
                            fv.append(
                                float(
                                    _mean_vec(qt, s["own_wv"], s["own_dim"])
                                    @ _mean_vec(tt, s["own_wv"], s["own_dim"])
                                )
                            )
                    out = {"query": q, "target": t, "features": fv}
                    if has_label:
                        out["label"] = float(lab)
                    rows.append(out)
                yield pd.DataFrame(rows)

        n_part = self.spark.sparkContext.defaultParallelism
        return pairs.repartition(n_part).mapInPandas(gen, schema)
