"""End-to-end TDmatch pipeline (Figure 3): graph -> (merge) -> (expand) ->
(compress) -> walks -> Word2Vec -> top-k matching.

``run_tdmatch`` is the single entry point used by every job/benchmark; the
paper's method variants map to configs:

* **W-RW**      — ``TDMatchConfig(expand=False)``
* **W-RW-EX**   — ``TDMatchConfig(expand=True)`` (+ a KB DataFrame)
* **MSP(β)**    — ``compress=("msp", β)`` on top of either
* **SSuM(r)**   — ``compress=("ssum", r)``

The result carries the ranked matches plus the graph-size trail
(original/expanded/compressed #nodes/#edges) that Table VIII reports.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, Optional, Tuple

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .compress import msp_compress, ssum_like_compress
from .embed import train_embeddings
from .expand import expand_graph
from .graph import Graph, build_graph, filter_to_term_corpus
from .match import top_k_matches
from .merge import merge_numeric_buckets, merge_synonyms
from .walks import generate_walks


@dataclass
class TDMatchConfig:
    """Knobs of the pipeline; defaults are scaled-down versions of the
    paper's (100 walks × length 30, dim 300) sized for local Spark."""

    max_n: int = 3
    do_stem: bool = True
    filter_second: bool = True
    auto_order: bool = True
    num_walks: int = 10
    walk_length: int = 12
    vector_size: int = 64
    window: int = 3  # paper: 3 for text-to-data, 15 for text-only
    w2v_iter: int = 1
    expand: bool = False
    sink_scope: str = "added"
    compress: Optional[Tuple[str, float]] = None  # ("msp", beta) | ("ssum", r)
    bucket_numeric: bool = False
    bucket_width: Optional[float] = None
    k: int = 20
    seed: int = 0
    # graph-size accounting costs extra Spark actions; Table VIII turns it on
    collect_sizes: bool = False


@dataclass
class TDMatchResult:
    matches: DataFrame  # (query, target, score, rank) with raw doc ids
    graph_sizes: Dict[str, Tuple[int, int]]  # stage -> (#nodes, #edges)
    embeddings: DataFrame  # (node, vector) for every graph node
    graph: Graph


def strip_prefix(col, corpus_name: str):
    """Graph doc id ``name::raw`` -> raw document id column."""
    return F.expr(f"substring({col}, {len(corpus_name) + 3})")


def run_tdmatch(
    spark: SparkSession,
    query_corpus,
    target_corpus,
    *,
    config: TDMatchConfig = TDMatchConfig(),
    kb: Optional[DataFrame] = None,
    synonyms: Optional[DataFrame] = None,
) -> TDMatchResult:
    """Run the full pipeline; queries come from ``query_corpus`` and are
    ranked against the documents of ``target_corpus``.

    Graph construction order (which corpus defines the term space, §II-B) is
    independent of query direction and handled inside ``build_graph``.
    """
    cfg = config
    sizes: Dict[str, Tuple[int, int]] = {}

    # Build unfiltered, merge variants first, then filter (§II-B): a merge
    # can fuse a second-corpus variant onto a first-corpus term, and the
    # filter must see the merged node, not the raw token stream. With a KB
    # present, filtering also keeps second-corpus terms the KB can bridge
    # (see filter_to_term_corpus).
    # Every stage function returns a materialized (localCheckpoint'ed)
    # graph, so plans stay flat and stage blocks are freed by the cleaner
    # once the next stage drops its reference.
    def step(new_graph: Graph) -> Graph:
        return new_graph

    graph = step(
        build_graph(
            spark,
            query_corpus,
            target_corpus,
            max_n=cfg.max_n,
            do_stem=cfg.do_stem,
            filter_second=False,
            auto_order=cfg.auto_order,
        )
    )
    if synonyms is not None:
        graph = step(merge_synonyms(graph, synonyms)[0])
    if cfg.bucket_numeric:
        graph = step(merge_numeric_buckets(graph, width=cfg.bucket_width)[0])
    if cfg.filter_second:
        graph = step(filter_to_term_corpus(graph, kb=kb if cfg.expand else None))
    if cfg.collect_sizes:
        sizes["original"] = (graph.num_nodes(), graph.num_edges())

    if cfg.expand:
        if kb is None:
            raise ValueError("expand=True requires a KB edge DataFrame")
        graph = step(expand_graph(graph, kb, sink_scope=cfg.sink_scope))
        if cfg.collect_sizes:
            sizes["expanded"] = (graph.num_nodes(), graph.num_edges())

    if cfg.compress is not None:
        kind, ratio = cfg.compress
        if kind == "msp":
            graph = step(msp_compress(graph, beta=ratio, seed=cfg.seed))
        elif kind == "ssum":
            graph = step(ssum_like_compress(graph, ratio=ratio, seed=cfg.seed))
        else:
            raise ValueError(f"unknown compression {kind!r}")
        if cfg.collect_sizes:
            sizes["compressed"] = (graph.num_nodes(), graph.num_edges())

    walks = generate_walks(
        graph, num_walks=cfg.num_walks, walk_length=cfg.walk_length, seed=cfg.seed
    ).cache()
    emb = train_embeddings(
        walks,
        vector_size=cfg.vector_size,
        window=cfg.window,
        seed=cfg.seed,
        max_iter=cfg.w2v_iter,
    ).cache()

    q_emb = emb.join(
        graph.doc_nodes(query_corpus.name).select(F.col("id").alias("node")), "node"
    )
    t_emb = emb.join(
        graph.doc_nodes(target_corpus.name).select(F.col("id").alias("node")), "node"
    )
    ranked = top_k_matches(q_emb, t_emb, k=cfg.k)
    matches = ranked.select(
        strip_prefix("query", query_corpus.name).alias("query"),
        strip_prefix("target", target_corpus.name).alias("target"),
        "score",
        "rank",
    ).cache()
    matches.count()  # materialize so the walk/embedding caches can go
    walks.unpersist()
    emb.unpersist()
    return TDMatchResult(matches=matches, graph_sizes=sizes, embeddings=emb, graph=graph)
