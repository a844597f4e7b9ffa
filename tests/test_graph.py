"""Tests for graph creation (Algorithm 1) and the Graph container."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import graph as G
from repro.core.graph import (
    StructuredTextCorpus,
    TableCorpus,
    TextCorpus,
    build_graph,
    canonical_edges,
    data_node_id,
    distinct_token_count,
    term_of,
)


@pytest.fixture(scope="module")
def example1(spark):
    """The paper's Example 1 (Figure 1/4) as corpora."""
    movies = spark.createDataFrame(
        pd.DataFrame(
            {
                "mid": [1, 2],
                "title": ["The Sixth Sense", "Pulp Fiction"],
                "director": ["Shyamalan", "Tarantino"],
                "actor": ["B. Willis", "B. Willis"],
                "rate": ["PG", "R"],
                "genre": ["Thriller", "Drama"],
            }
        )
    )
    reviews = spark.createDataFrame(
        pd.DataFrame(
            {
                "rid": [1, 2],
                "text": [
                    "bland Bruce Willis story with comedy by Tarantino",
                    "Willis asks Osment received a PG thriller",
                ],
            }
        )
    )
    table = TableCorpus("movies", movies, "mid", ["title", "director", "actor", "rate", "genre"])
    text = TextCorpus("reviews", reviews, "rid", "text")
    return table, text


@pytest.fixture(scope="module")
def g1(spark, example1):
    """Graph with the table as the term-defining (first) corpus."""
    table, text = example1
    return build_graph(spark, table, text, max_n=2, auto_order=False)


class TestBuildGraph:
    def test_metadata_nodes_present(self, g1):
        ids = {r["id"] for r in g1.metadata_nodes().collect()}
        assert {"movies::1", "movies::2", "reviews::1", "reviews::2"} <= ids

    def test_column_nodes_present(self, g1):
        cols = {r["id"] for r in g1.nodes.where(F.col("type") == G.COLUMN).collect()}
        assert cols == {
            f"col::movies::{a}" for a in ["title", "director", "actor", "rate", "genre"]
        }

    def test_doc_nodes_exclude_columns(self, g1):
        types = {r["type"] for r in g1.doc_nodes().collect()}
        assert G.COLUMN not in types

    def test_shared_term_single_node(self, g1):
        willis = [r for r in g1.nodes.collect() if r["id"] == data_node_id("willi")]
        assert len(willis) == 1

    def test_tuple_connected_to_its_terms(self, g1):
        edges = {(r["src"], r["dst"]) for r in g1.symmetric_edges().collect()}
        assert ("movies::1", data_node_id("shyamalan")) in edges
        assert ("movies::2", data_node_id("tarantino")) in edges

    def test_column_connected_to_domain_terms(self, g1):
        edges = {(r["src"], r["dst"]) for r in g1.symmetric_edges().collect()}
        assert ("col::movies::genre", data_node_id("thriller")) in edges
        assert ("col::movies::genre", data_node_id("drama")) in edges

    def test_no_cross_attribute_ngrams(self, g1):
        # "Shyamalan" (director) and "B. Willis" (actor) are different cells:
        # no bigram spans them
        ids = {r["id"] for r in g1.nodes.collect()}
        assert data_node_id("shyamalan_b") not in ids

    def test_second_corpus_terms_filtered(self, g1):
        # review bigram "bruce_willi" does not exist in the table's term
        # space, so §II-B filtering drops it; the unigram bridge survives
        ids = {r["id"] for r in g1.nodes.collect()}
        assert data_node_id("bruce_willi") not in ids
        assert data_node_id("willi") in ids

    def test_text_ngrams_within_sentence(self, spark, example1):
        table, text = example1
        g = build_graph(spark, text, table, max_n=2, auto_order=False)
        ids = {r["id"] for r in g.nodes.collect()}
        assert data_node_id("bruce_willi") in ids

    def test_metadata_never_linked_across_corpora(self, g1):
        meta = {r["id"] for r in g1.metadata_nodes().collect()}
        for r in g1.edges.collect():
            assert not (r["src"] in meta and r["dst"] in meta)

    def test_filter_second_drops_unshared_terms(self, spark, example1):
        table, text = example1
        g = build_graph(spark, text, table, max_n=1, auto_order=False)
        ids = {r["id"] for r in g.nodes.collect()}
        # "osment" appears only in reviews (second corpus after auto order
        # disabled: first=text) — here first corpus is text so osment stays
        assert data_node_id("osment") in ids
        g2 = build_graph(spark, table, text, max_n=1, auto_order=False)
        ids2 = {r["id"] for r in g2.nodes.collect()}
        # with the table first, review-only terms are filtered out (§II-B)
        assert data_node_id("osment") not in ids2

    def test_no_filter_keeps_everything(self, spark, example1):
        table, text = example1
        g = build_graph(spark, table, text, max_n=1, auto_order=False, filter_second=False)
        ids = {r["id"] for r in g.nodes.collect()}
        assert data_node_id("osment") in ids

    def test_auto_order_prefers_smaller_token_set(self, spark, example1):
        table, text = example1
        # this toy text corpus has fewer distinct tokens than the table, so
        # auto ordering makes the *text* define the term space regardless of
        # argument order: review-only terms survive, table-only terms don't
        assert distinct_token_count(text) < distinct_token_count(table)
        for a, b in ((text, table), (table, text)):
            g = build_graph(spark, a, b, max_n=1)  # auto_order on
            ids = {r["id"] for r in g.nodes.collect()}
            assert data_node_id("osment") in ids
            assert data_node_id("sixth") not in ids

    def test_edges_canonical(self, g1):
        for r in g1.edges.collect():
            assert r["src"] < r["dst"]

    def test_edges_distinct(self, g1):
        assert g1.edges.count() == g1.edges.distinct().count()


class TestStructuredCorpus:
    @pytest.fixture(scope="class")
    def tax_graph(self, spark):
        tax = spark.createDataFrame(
            pd.DataFrame(
                {
                    "cid": [1, 2, 3],
                    "label": ["audit programme", "iso rules", "risk approach"],
                    "parent": [None, 1.0, 2.0],
                }
            )
        )
        docs = spark.createDataFrame(
            pd.DataFrame({"did": [1], "text": ["risk based approach to audit programme"]})
        )
        return build_graph(
            spark,
            StructuredTextCorpus("tax", tax, "cid", "label", "parent"),
            TextCorpus("docs", docs, "did", "text"),
            max_n=2,
            auto_order=False,
        )

    def test_hierarchy_edges(self, tax_graph):
        edges = {(r["src"], r["dst"]) for r in tax_graph.symmetric_edges().collect()}
        assert ("tax::2", "tax::1") in edges
        assert ("tax::3", "tax::2") in edges

    def test_concept_type(self, tax_graph):
        types = dict((r["id"], r["type"]) for r in tax_graph.nodes.collect())
        assert types["tax::1"] == G.CONCEPT
        assert types["docs::1"] == G.TEXT

    def test_one_hierarchy_edge_per_parent_link(self, tax_graph):
        edges = {(r["src"], r["dst"]) for r in tax_graph.edges.collect()}
        concept_edges = [
            e for e in edges if e[0].startswith("tax::") and e[1].startswith("tax::")
        ]
        # two non-null parent links -> exactly two concept-concept edges
        assert sorted(concept_edges) == [("tax::1", "tax::2"), ("tax::2", "tax::3")]


class TestGraphOps:
    def test_degrees_against_oracle(self, spark, g1):
        from repro.oracle import assert_equivalent

        edges_pdf = g1.edges.toPandas()
        got = g1.degrees()
        sql = """
            SELECT id, COUNT(*)::BIGINT AS degree FROM (
              SELECT src AS id FROM e UNION ALL SELECT dst AS id FROM e
            ) GROUP BY id
        """
        assert_equivalent(got, sql, e=edges_pdf)

    def test_symmetric_edges_double(self, g1):
        assert g1.symmetric_edges().count() == 2 * g1.num_edges()

    def test_adjacency_is_symmetric(self, g1):
        adj = g1.adjacency()
        for u, nbrs in adj.items():
            for v in nbrs:
                assert u in adj[v]

    def test_adjacency_no_self_loops(self, g1):
        adj = g1.adjacency()
        for u, nbrs in adj.items():
            assert u not in nbrs

    def test_subgraph_induced(self, spark, g1):
        keep = g1.nodes.limit(5).select("id")
        sub = g1.subgraph(keep)
        kept = {r["id"] for r in keep.collect()}
        for r in sub.edges.collect():
            assert r["src"] in kept and r["dst"] in kept

    def test_without_nodes(self, spark, g1):
        drop = g1.nodes.where(F.col("type") == G.COLUMN).select("id")
        g2 = g1.without_nodes(drop)
        assert g2.nodes.where(F.col("type") == G.COLUMN).count() == 0

    def test_canonical_edges_dedup(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"src": ["b", "a", "a"], "dst": ["a", "b", "a"]})
        )
        out = canonical_edges(df).collect()
        assert len(out) == 1 and out[0]["src"] == "a" and out[0]["dst"] == "b"

    def test_term_roundtrip(self):
        assert term_of(data_node_id("abc_def")) == "abc_def"
        with pytest.raises(ValueError):
            term_of("movies::1")
