"""Shared plumbing for baselines: document views and serialization.

Baselines operate on flat documents, not on the graph. A *document view* is
a DataFrame(doc: string, text: string). Tables are serialized to text with
the ``[COL] attr [VAL] value`` convention the paper borrows from Ditto.
"""
from __future__ import annotations

from typing import Sequence

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..core.graph import TableCorpus, TextCorpus
from ..core.preprocess import content_tokens


def serialize_table(corpus: TableCorpus) -> DataFrame:
    """TableCorpus -> (doc, text) rows serialized as "[COL] a [VAL] v ..."."""
    parts = []
    for a in corpus.attr_cols:
        parts.extend([F.lit(f"[COL] {a} [VAL]"), F.col(a).cast("string")])
    return corpus.df.select(
        F.col(corpus.id_col).cast("string").alias("doc"),
        F.concat_ws(" ", *parts).alias("text"),
    )


def text_view(corpus) -> DataFrame:
    """Any corpus -> (doc, text); tables are serialized."""
    if corpus.kind == "table":
        return serialize_table(corpus)
    return corpus.df.select(
        F.col(corpus.id_col).cast("string").alias("doc"),
        F.col(corpus.text_col).alias("text"),
    )


def doc_tokens(view: DataFrame, *, do_stem: bool = True) -> DataFrame:
    """(doc, text) -> (doc, tokens: array<string>) with stop-words removed.

    ``[COL]``/``[VAL]`` markers survive as tokens ("col"/"val"), as they do
    for the serialized baselines in the paper.
    """

    @F.udf("array<string>")
    def _toks(text):
        return content_tokens(text or "", do_stem=do_stem)

    return view.select("doc", _toks("text").alias("tokens"))


def exploded_tokens(view: DataFrame, *, do_stem: bool = True) -> DataFrame:
    """(doc, text) -> (doc, token) distinct-per-position exploded rows."""
    return doc_tokens(view, do_stem=do_stem).select(
        "doc", F.explode("tokens").alias("token")
    )
