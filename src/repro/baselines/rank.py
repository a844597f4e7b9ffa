"""Supervised pair-scoring harness + the RANK* baseline.

RANK* in the paper is a learning-to-rank reranker with a pairwise loss [39],
fine-tuned on 60% of the annotated pairs and reported with 5-fold cross
validation. Our substitute trains a Spark ML logistic regression over pair
features (DESIGN.md §4): positives are ground-truth pairs, negatives are the
hardest non-matching candidates by TF-IDF (plus random ones), mirroring how
rerankers are trained from retrieval candidates.

``kfold_rank`` is shared by every supervised baseline: queries are split
into folds; each fold's rankings are produced by a model trained on the
*other* folds' labels, and the per-fold rankings are concatenated so metrics
cover every query — the paper's CV protocol.
"""
from __future__ import annotations

from typing import Callable, List, Sequence

import numpy as np
import pandas as pd
from pyspark.ml.classification import LogisticRegression
from pyspark.ml.functions import array_to_vector, vector_to_array
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from .features import PairFeaturizer


def _training_pairs(
    featurizer: PairFeaturizer,
    truth_pdf: pd.DataFrame,
    train_queries: Sequence[str],
    *,
    neg_per_pos: int = 5,
    seed: int = 0,
) -> pd.DataFrame:
    """(query, target, label) rows: gold positives + sampled hard negatives."""
    rng = np.random.default_rng(seed)
    truth = truth_pdf[truth_pdf["query"].isin(train_queries)]
    pos_of = truth.groupby("query")["target"].apply(set).to_dict()
    targets = list(featurizer.t_tokens)
    rows = []
    for q in train_queries:
        gold = pos_of.get(q, set())
        if not gold:
            continue
        qv = featurizer.q_tfidf.get(q, {})
        # hard negatives: highest tf-idf cosine non-gold targets
        sims = []
        for t in targets:
            if t in gold:
                continue
            tv = featurizer.t_tfidf.get(t, {})
            small, big = (qv, tv) if len(qv) < len(tv) else (tv, qv)
            sims.append((sum(x * big.get(w, 0.0) for w, x in small.items()), t))
        sims.sort(reverse=True)
        n_hard = min(len(sims), max(1, neg_per_pos * len(gold) // 2))
        negs = [t for _, t in sims[:n_hard]]
        n_rand = neg_per_pos * len(gold) - len(negs)
        pool = [t for t in targets if t not in gold and t not in set(negs)]
        if n_rand > 0 and pool:
            negs += [pool[int(i)] for i in rng.choice(len(pool), size=min(n_rand, len(pool)), replace=False)]
        rows.extend({"query": q, "target": t, "label": 1.0} for t in gold)
        rows.extend({"query": q, "target": t, "label": 0.0} for t in negs)
    return pd.DataFrame(rows)


def kfold_rank(
    spark: SparkSession,
    featurizer: PairFeaturizer,
    truth: DataFrame,
    *,
    k: int = 20,
    n_folds: int = 5,
    train_frac: float = 0.6,
    neg_per_pos: int = 5,
    seed: int = 0,
) -> DataFrame:
    """Cross-validated supervised ranking -> (query, target, score, rank).

    Per fold, a logistic regression is fit on ``train_frac`` of the
    *training* queries' labeled pairs and scores all (test query × target)
    pairs; ranked lists are concatenated over folds.
    """
    truth_pdf = truth.select(
        F.col("query").cast("string"), F.col("target").cast("string")
    ).toPandas()
    queries = sorted(set(featurizer.q_tokens) & set(truth_pdf["query"]))
    rng = np.random.default_rng(seed)
    order = list(rng.permutation(queries))
    folds: List[List[str]] = [order[i::n_folds] for i in range(n_folds)]

    all_pairs = featurizer.all_pairs()
    feat_all = featurizer.featurize(all_pairs).withColumn(
        "f", array_to_vector("features")
    ).cache()
    feat_all.count()

    ranked_parts = []
    for fi, test_q in enumerate(folds):
        train_pool = [q for q in queries if q not in set(test_q)]
        n_train = max(1, int(len(queries) * train_frac))
        train_q = train_pool[:n_train]
        tp = _training_pairs(
            featurizer, truth_pdf, train_q, neg_per_pos=neg_per_pos, seed=seed + fi
        )
        if tp.empty or tp["label"].nunique() < 2:
            continue
        train_df = featurizer.featurize(
            spark.createDataFrame(tp)
        ).withColumn("f", array_to_vector("features"))
        lr = LogisticRegression(featuresCol="f", labelCol="label", maxIter=50, regParam=0.01)
        model = lr.fit(train_df)
        test_feat = feat_all.where(F.col("query").isin(test_q))
        scored = model.transform(test_feat).select(
            "query",
            "target",
            F.element_at(vector_to_array("probability"), 2).alias("score"),
        )
        w = Window.partitionBy("query").orderBy(F.desc("score"), F.asc("target"))
        ranked_parts.append(
            scored.withColumn("rank", F.row_number().over(w)).where(F.col("rank") <= k)
        )
    out = ranked_parts[0]
    for p in ranked_parts[1:]:
        out = out.unionByName(p)
    out = out.select("query", "target", "score", "rank").cache()
    out.count()  # materialize before releasing the feature cache
    feat_all.unpersist()
    return out


def rank_match(
    spark: SparkSession,
    query_corpus,
    target_corpus,
    truth: DataFrame,
    *,
    k: int = 20,
    bg_vectors: DataFrame = None,
    seed: int = 0,
    n_folds: int = 5,
) -> DataFrame:
    """RANK* baseline: LTR over lexical + pre-trained-embedding features."""
    features = ["tfidf_cos", "jaccard", "overlap", "rare"]
    if bg_vectors is not None:
        features.append("bg_cos")
    fz = PairFeaturizer(
        spark, query_corpus, target_corpus, features=features, bg_vectors=bg_vectors
    )
    return kfold_rank(spark, fz, truth, k=k, seed=seed, n_folds=n_folds)
