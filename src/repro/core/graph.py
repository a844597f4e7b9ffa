"""Graph creation over heterogeneous corpora (paper §II, Algorithm 1).

The graph is held as two DataFrames:

* ``nodes(id, type, corpus)`` — ``type`` ∈ {``data``, ``tuple``, ``column``,
  ``text``, ``concept``}; ``corpus`` is the corpus name for metadata nodes
  and ``""`` for shared data nodes (a term appearing in both corpora is one
  node, §II).
* ``edges(src, dst)`` — undirected, stored once in canonical order
  (``src < dst``), no self loops, distinct.

Corpus kinds mirror the paper's three document types: a relational table
(documents = tuples, plus column metadata nodes), plain text (documents =
paragraphs/sentences), and structured text (documents = taxonomy concepts,
with parent edges between metadata nodes, §II-A).

Term filtering (§II-B): ``build_graph`` creates data nodes from the corpus
with the smaller number of distinct tokens and keeps, for the other corpus,
only terms already in the graph. Callers pass corpora in any order;
``build_graph`` reorders internally (disable with ``auto_order=False``).
"""
from __future__ import annotations

from dataclasses import dataclass, field, replace
from typing import Dict, List, Optional, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .preprocess import explode_terms

DATA = "data"
TUPLE = "tuple"
COLUMN = "column"
TEXT = "text"
CONCEPT = "concept"
METADATA_TYPES = (TUPLE, COLUMN, TEXT, CONCEPT)
# Column nodes exist to create 2-hop paths inside one corpus; they are not
# matched across corpora, so matching and MSP sampling use DOC_TYPES only.
DOC_TYPES = (TUPLE, TEXT, CONCEPT)

DATA_PREFIX = "d::"


def data_node_id(term: str) -> str:
    return DATA_PREFIX + term


def is_data_node_id(node_id: str) -> bool:
    return node_id.startswith(DATA_PREFIX)


def term_of(node_id: str) -> str:
    """Inverse of :func:`data_node_id` (raises on non-data ids)."""
    if not is_data_node_id(node_id):
        raise ValueError(f"not a data node: {node_id}")
    return node_id[len(DATA_PREFIX) :]


@dataclass(frozen=True)
class TableCorpus:
    """A relational table: one document (metadata node) per tuple.

    ``id_col`` must be unique; ``attr_cols`` are the textual attributes whose
    cell values become terms. Every attribute also becomes a column metadata
    node connected to the terms of its active domain (Alg. 1 lines 5-10, 23).
    """

    name: str
    df: DataFrame
    id_col: str
    attr_cols: Sequence[str]
    kind: str = field(default="table", init=False)

    def doc_id(self, raw) -> str:
        return f"{self.name}::{raw}"


@dataclass(frozen=True)
class TextCorpus:
    """Free text: one document per row (sentence or paragraph granularity)."""

    name: str
    df: DataFrame
    id_col: str
    text_col: str
    kind: str = field(default="text", init=False)

    def doc_id(self, raw) -> str:
        return f"{self.name}::{raw}"


@dataclass(frozen=True)
class StructuredTextCorpus:
    """Structured text (taxonomy): documents are concept nodes; ``parent_col``
    (nullable id) adds metadata-metadata edges for the hierarchy (§II-A)."""

    name: str
    df: DataFrame
    id_col: str
    text_col: str
    parent_col: str
    kind: str = field(default="structured", init=False)

    def doc_id(self, raw) -> str:
        return f"{self.name}::{raw}"


Corpus = object  # union of the three dataclasses above


@dataclass
class Graph:
    """Undirected graph as (nodes, edges) DataFrames; see module docstring.

    ``term_corpus`` records which corpus defined the term space (§II-B) when
    the graph came out of :func:`build_graph`.
    """

    nodes: DataFrame
    edges: DataFrame
    term_corpus: Optional[str] = None

    def cache(self) -> "Graph":
        self.nodes = self.nodes.cache()
        self.edges = self.edges.cache()
        return self

    def materialize(self) -> "Graph":
        """Compute the graph eagerly and truncate its logical plan.

        Graph pipelines (build -> merge -> filter -> expand -> compress)
        stack unions, UDF explosions and joins; a plain ``cache()`` keeps
        the full lineage in every downstream logical plan and Catalyst
        analysis time blows up super-linearly (observed: minutes of driver
        CPU hashing plan trees at toy scale). ``localCheckpoint`` executes
        the stage once and replaces the plan with a scan of the stored
        blocks — the standard idiom for iterative graph dataflows on Spark.
        """
        self.nodes = self.nodes.localCheckpoint(eager=True)
        self.edges = self.edges.localCheckpoint(eager=True)
        return self

    def unpersist(self) -> "Graph":
        """Release cache blocks if any (no-op for checkpointed stages;
        their blocks are freed by the ContextCleaner once unreferenced)."""
        self.nodes.unpersist()
        self.edges.unpersist()
        return self

    def num_nodes(self) -> int:
        return self.nodes.count()

    def num_edges(self) -> int:
        return self.edges.count()

    def metadata_nodes(self, corpus: Optional[str] = None) -> DataFrame:
        out = self.nodes.where(F.col("type").isin(list(METADATA_TYPES)))
        if corpus is not None:
            out = out.where(F.col("corpus") == corpus)
        return out

    def doc_nodes(self, corpus: Optional[str] = None) -> DataFrame:
        """Matchable document nodes (tuples/texts/concepts, no column nodes)."""
        out = self.nodes.where(F.col("type").isin(list(DOC_TYPES)))
        if corpus is not None:
            out = out.where(F.col("corpus") == corpus)
        return out

    def symmetric_edges(self) -> DataFrame:
        """Both directions of every undirected edge (for adjacency/joins)."""
        rev = self.edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
        return self.edges.unionByName(rev)

    def degrees(self) -> DataFrame:
        """DataFrame(id, degree) over nodes incident to at least one edge."""
        return (
            self.symmetric_edges()
            .groupBy(F.col("src").alias("id"))
            .agg(F.count("*").alias("degree"))
        )

    def adjacency(self) -> Dict[str, List[str]]:
        """Collected adjacency dict (node -> sorted neighbor list).

        Graphs in this reproduction are small (≤ a few hundred-k edges), so
        adjacency is collected to the driver and broadcast to workers for
        random walks / BFS (see DESIGN.md layering note).
        """
        pdf = (
            self.symmetric_edges()
            .groupBy("src")
            .agg(F.sort_array(F.collect_set("dst")).alias("nbrs"))
            .toPandas()
        )
        return dict(zip(pdf["src"], (list(n) for n in pdf["nbrs"])))

    def subgraph(self, keep_nodes: DataFrame) -> "Graph":
        """Induced subgraph on ``keep_nodes`` (a DataFrame with column ``id``)."""
        keep = keep_nodes.select("id").distinct()
        nodes = self.nodes.join(keep, "id")
        edges = (
            self.edges.join(keep.withColumnRenamed("id", "src"), "src")
            .join(keep.withColumnRenamed("id", "dst"), "dst")
            .select("src", "dst")
        )
        return Graph(nodes, edges, self.term_corpus)

    def without_nodes(self, drop_nodes: DataFrame) -> "Graph":
        keep = self.nodes.join(drop_nodes.select("id").distinct(), "id", "left_anti")
        return self.subgraph(keep)


def canonical_edges(df: DataFrame) -> DataFrame:
    """Normalize an edge list: undirected canonical order, no loops, distinct."""
    return (
        df.select(
            F.least("src", "dst").alias("src"), F.greatest("src", "dst").alias("dst")
        )
        .where(F.col("src") != F.col("dst"))
        .distinct()
    )


def _doc_terms(corpus, *, max_n: int, do_stem: bool) -> DataFrame:
    """DataFrame(doc, term) for a corpus, with prefixed metadata doc ids."""
    if corpus.kind == "table":
        # terms are built per cell value: n-grams never span two attributes
        df = corpus.df.select(
            F.col(corpus.id_col).cast("string").alias("_raw_id"),
            F.explode(
                F.array(*[F.col(c).cast("string") for c in corpus.attr_cols])
            ).alias("_text"),
        )
    else:
        df = corpus.df.select(
            F.col(corpus.id_col).cast("string").alias("_raw_id"),
            F.col(corpus.text_col).alias("_text"),
        )
    out = explode_terms(df, "_raw_id", "_text", max_n=max_n, do_stem=do_stem)
    return out.select(
        F.concat(F.lit(corpus.name + "::"), F.col("_raw_id")).alias("doc"), "term"
    )


def _attr_terms(corpus: TableCorpus, *, max_n: int, do_stem: bool) -> DataFrame:
    """DataFrame(col_node, term): each attribute's active-domain terms."""
    parts = []
    for attr in corpus.attr_cols:
        t = explode_terms(
            corpus.df.select(F.lit(attr).alias("_attr"), F.col(attr).cast("string").alias("_v")),
            "_attr",
            "_v",
            max_n=max_n,
            do_stem=do_stem,
        )
        parts.append(
            t.select(
                F.concat(F.lit(f"col::{corpus.name}::"), F.col("_attr")).alias("col_node"),
                "term",
            )
        )
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out.distinct()


def distinct_token_count(corpus, *, do_stem: bool = True) -> int:
    """Distinct unigram tokens of a corpus — the §II-B ordering criterion."""
    return (
        _doc_terms(corpus, max_n=1, do_stem=do_stem).select("term").distinct().count()
    )


def build_graph(
    spark: SparkSession,
    first,
    second,
    *,
    max_n: int = 3,
    do_stem: bool = True,
    filter_second: bool = True,
    auto_order: bool = True,
) -> Graph:
    """Algorithm 1: build the joint graph over two corpora.

    When ``auto_order`` is set (default), the corpus with fewer distinct
    tokens plays the role of the *first* set so its terms define the data
    nodes and the other corpus is filtered against them (§II-B). Metadata
    nodes are created for every document of both corpora regardless.
    """
    if auto_order and distinct_token_count(second, do_stem=do_stem) < distinct_token_count(
        first, do_stem=do_stem
    ):
        first, second = second, first

    dt1 = _doc_terms(first, max_n=max_n, do_stem=do_stem).cache()
    dt2 = _doc_terms(second, max_n=max_n, do_stem=do_stem)
    if filter_second:
        dt2 = dt2.join(dt1.select("term").distinct(), "term", "left_semi")
    dt2 = dt2.cache()

    def _meta_nodes(corpus) -> DataFrame:
        t = {"table": TUPLE, "text": TEXT, "structured": CONCEPT}[corpus.kind]
        return corpus.df.select(
            F.concat(
                F.lit(corpus.name + "::"), F.col(corpus.id_col).cast("string")
            ).alias("id"),
            F.lit(t).alias("type"),
            F.lit(corpus.name).alias("corpus"),
        )

    node_parts = [_meta_nodes(first), _meta_nodes(second)]
    edge_parts = [
        dt1.select(F.col("doc").alias("src"), F.concat(F.lit(DATA_PREFIX), "term").alias("dst")),
        dt2.select(F.col("doc").alias("src"), F.concat(F.lit(DATA_PREFIX), "term").alias("dst")),
    ]

    for corpus in (first, second):
        if corpus.kind == "table":
            # a metadata node per attribute, unconditionally (Alg. 1 l. 5-10)
            node_parts.append(
                spark.createDataFrame(
                    [(f"col::{corpus.name}::{a}", COLUMN, corpus.name) for a in corpus.attr_cols],
                    "id string, type string, corpus string",
                )
            )
            at = _attr_terms(corpus, max_n=max_n, do_stem=do_stem)
            if corpus is second and filter_second:
                # column-term edges only for terms surviving §II-B filtering
                at = at.join(dt1.select("term").distinct(), "term", "left_semi")
            edge_parts.append(
                at.select(
                    F.col("col_node").alias("src"),
                    F.concat(F.lit(DATA_PREFIX), "term").alias("dst"),
                )
            )
        elif corpus.kind == "structured":
            # hierarchy edges between concept metadata nodes (§II-A); the
            # parent id is resolved by joining back on the id column so its
            # physical type (often float, from nullable pandas columns)
            # never leaks into the node id string
            pre = corpus.name + "::"
            child = corpus.df.select(
                F.col(corpus.id_col).cast("string").alias("_cid"),
                F.col(corpus.parent_col).alias("_pref"),
            ).where(F.col("_pref").isNotNull())
            parent = corpus.df.select(
                F.col(corpus.id_col).alias("_pid_raw"),
                F.col(corpus.id_col).cast("string").alias("_pid"),
            )
            hier = child.join(
                parent, child["_pref"] == parent["_pid_raw"]
            ).select(
                F.concat(F.lit(pre), "_cid").alias("src"),
                F.concat(F.lit(pre), "_pid").alias("dst"),
            )
            edge_parts.append(hier)

    data_nodes = (
        dt1.select("term")
        .union(dt2.select("term"))
        .distinct()
        .select(
            F.concat(F.lit(DATA_PREFIX), "term").alias("id"),
            F.lit(DATA).alias("type"),
            F.lit("").alias("corpus"),
        )
    )
    node_parts.append(data_nodes)

    nodes = node_parts[0]
    for p in node_parts[1:]:
        nodes = nodes.unionByName(p)
    edges = edge_parts[0]
    for p in edge_parts[1:]:
        edges = edges.unionByName(p)

    out = Graph(nodes.distinct(), canonical_edges(edges), first.name).materialize()
    dt1.unpersist()
    dt2.unpersist()
    return out


def filter_to_term_corpus(graph: Graph, *, kb: Optional[DataFrame] = None) -> Graph:
    """Graph-level §II-B filtering, merge- and expansion-aware.

    Drops data nodes that have no edge to any metadata node of the
    term-defining corpus (``graph.term_corpus``) — the same semantics as
    ``build_graph(filter_second=True)``, but applied *after* node merging so
    a second-corpus variant fused onto a first-corpus term survives.

    When ``kb`` is given (expansion planned), second-corpus-only terms that
    the KB relates to a surviving term are kept as well: the expansion step
    will connect them (this is how the review-side "Comedy" of the paper's
    Figure 4/5 stays available for the style(Tarantino, Comedy) bridge).
    """
    if graph.term_corpus is None:
        raise ValueError("graph has no recorded term corpus")
    sym = graph.symmetric_edges()
    first_meta = graph.metadata_nodes(graph.term_corpus).select("id")
    keep = (
        sym.join(first_meta.withColumnRenamed("id", "src"), "src", "left_semi")
        .select(F.col("dst").alias("id"))
        .distinct()
    )
    if kb is not None:
        kept_terms = keep.where(F.col("id").startswith(DATA_PREFIX)).select(
            F.expr(f"substring(id, {len(DATA_PREFIX) + 1})").alias("term")
        )
        kbe = kb.select("subject", "object")
        kbe = kbe.unionByName(
            kbe.select(F.col("object").alias("subject"), F.col("subject").alias("object"))
        )
        bridged = (
            kbe.join(kept_terms.withColumnRenamed("term", "object"), "object", "left_semi")
            .select(F.concat(F.lit(DATA_PREFIX), "subject").alias("id"))
            .distinct()
        )
        keep = keep.unionByName(bridged).distinct()
    keep = keep.unionByName(graph.metadata_nodes().select("id")).distinct()
    drop = (
        graph.nodes.where(F.col("type") == DATA)
        .select("id")
        .join(keep, "id", "left_anti")
    )
    return graph.without_nodes(drop).materialize()
