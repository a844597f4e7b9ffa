"""Matching metadata nodes (paper §IV-B): top-k cosine neighbours.

Given embeddings for query documents (first corpus) and target documents
(second corpus), return the top-k targets per query by cosine similarity.

Two implementations:

* :func:`top_k_matches` — production path: L2-normalize both sides, broadcast
  the (small) target matrix, and let each partition of queries do a dense
  matmul + arg-top-k in NumPy via ``mapInPandas``.
* :func:`top_k_matches_join` — pure Spark-SQL formulation (explode vector
  dimensions, join, aggregate, window rank). Quadratic shuffle, used in
  tests to cross-check the dense path and as the reference semantics.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def _normalized_pdf(emb: DataFrame, id_col: str) -> pd.DataFrame:
    pdf = emb.select(F.col(id_col).alias("id"), "vector").toPandas()
    mat = np.stack(pdf["vector"].map(np.asarray)) if len(pdf) else np.zeros((0, 1))
    norms = np.linalg.norm(mat, axis=1, keepdims=True)
    norms[norms == 0] = 1.0
    pdf["_mat_row"] = range(len(pdf))
    return pdf, mat / norms


def top_k_matches(
    query_emb: DataFrame,
    target_emb: DataFrame,
    *,
    k: int,
    query_col: str = "node",
    target_col: str = "node",
) -> DataFrame:
    """DataFrame(query, target, score, rank) — rank 1..k per query.

    Deterministic: ties in score are broken by target id (ascending), so two
    runs of the same pipeline produce identical ranked lists.
    """
    spark = query_emb.sparkSession
    t_pdf, t_mat = _normalized_pdf(target_emb, target_col)
    t_ids = np.asarray(t_pdf["id"], dtype=object)
    b_mat = spark.sparkContext.broadcast(t_mat)
    b_ids = spark.sparkContext.broadcast(t_ids)
    kk = min(k, len(t_ids))

    def gen(batches: Iterable[pd.DataFrame]):
        mat, ids = b_mat.value, b_ids.value
        # secondary sort key: target id (stable tie-break)
        id_order = np.argsort(np.argsort(ids))
        for pdf in batches:
            if pdf.empty:
                yield pd.DataFrame(columns=["query", "target", "score", "rank"])
                continue
            q = np.stack(pdf["vector"].map(np.asarray))
            qn = np.linalg.norm(q, axis=1, keepdims=True)
            qn[qn == 0] = 1.0
            sims = (q / qn) @ mat.T
            out_rows = []
            for qi, qid in enumerate(pdf["qid"]):
                s = sims[qi]
                # sort by (-score, id) for deterministic ties
                order = np.lexsort((id_order, -s))[:kk]
                for r, ti in enumerate(order, start=1):
                    out_rows.append((qid, ids[ti], float(s[ti]), r))
            yield pd.DataFrame(out_rows, columns=["query", "target", "score", "rank"])

    q = query_emb.select(F.col(query_col).alias("qid"), "vector")
    return q.mapInPandas(gen, "query string, target string, score double, rank int")


def top_k_matches_join(
    query_emb: DataFrame,
    target_emb: DataFrame,
    *,
    k: int,
    query_col: str = "node",
    target_col: str = "node",
) -> DataFrame:
    """Reference Spark-SQL top-k cosine via dimension-explode + join."""

    def _explode_norm(emb: DataFrame, idc: str, side: str) -> DataFrame:
        norm = F.sqrt(
            F.aggregate("vector", F.lit(0.0), lambda a, x: a + x * x)
        )
        return (
            emb.select(
                F.col(idc).alias(side),
                F.posexplode(
                    F.transform("vector", lambda x: x / F.when(norm == 0, 1.0).otherwise(norm))
                ).alias("dim", side + "_v"),
            )
        )

    qe = _explode_norm(query_emb, query_col, "query")
    te = _explode_norm(target_emb, target_col, "target")
    scores = (
        qe.join(te, "dim")
        .groupBy("query", "target")
        .agg(F.sum(F.col("query_v") * F.col("target_v")).alias("score"))
    )
    w = Window.partitionBy("query").orderBy(F.desc("score"), F.asc("target"))
    return (
        scores.withColumn("rank", F.row_number().over(w))
        .where(F.col("rank") <= k)
        .select("query", "target", F.round("score", 9).alias("score"), "rank")
    )


def average_scores(a: DataFrame, b: DataFrame, *, k: int) -> DataFrame:
    """Combine two matchers by averaging cosine scores (paper §V-F2).

    Missing (query, target) pairs on one side contribute score 0; the
    combined list is re-ranked per query.
    """
    pa = a.select("query", "target", F.col("score").alias("sa"))
    pb = b.select("query", "target", F.col("score").alias("sb"))
    both = pa.join(pb, ["query", "target"], "full").fillna(0.0, ["sa", "sb"])
    combo = both.select(
        "query", "target", ((F.col("sa") + F.col("sb")) / 2).alias("score")
    )
    w = Window.partitionBy("query").orderBy(F.desc("score"), F.asc("target"))
    return (
        combo.withColumn("rank", F.row_number().over(w))
        .where(F.col("rank") <= k)
        .select("query", "target", "score", "rank")
    )
