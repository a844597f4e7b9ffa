"""Tests for graph expansion (Algorithm 2) and sink removal."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.expand import expand_graph
from repro.core.graph import TableCorpus, TextCorpus, build_graph, data_node_id


@pytest.fixture(scope="module")
def g(spark):
    t = spark.createDataFrame(
        pd.DataFrame({"tid": [1, 2], "a": ["tarantino drama", "shyamalan thriller"]})
    )
    s = spark.createDataFrame(
        pd.DataFrame({"sid": [1, 2], "text": ["tarantino comedy film", "shyamalan thriller film"]})
    )
    return build_graph(
        spark, TextCorpus("s", s, "sid", "text"), TableCorpus("t", t, "tid", ["a"]),
        max_n=1, auto_order=False,
    )


def _kb(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["subject", "object"]))


class TestExpand:
    def test_adds_edge_between_existing_terms(self, spark, g):
        kb = _kb(spark, [("tarantino", "comedy")])
        out = expand_graph(g, kb)
        edges = {(r["src"], r["dst"]) for r in out.symmetric_edges().collect()}
        assert (data_node_id("tarantino"), data_node_id("comedy")) in edges

    def test_symmetric_fetch(self, spark, g):
        # KB stores (comedy, tarantino); node tarantino still fetches it
        kb = _kb(spark, [("comedy", "tarantino")])
        out = expand_graph(g, kb)
        edges = {(r["src"], r["dst"]) for r in out.symmetric_edges().collect()}
        assert (data_node_id("tarantino"), data_node_id("comedy")) in edges

    def test_new_node_with_two_connections_kept(self, spark, g):
        kb = _kb(spark, [("tarantino", "style"), ("comedy", "style")])
        out = expand_graph(g, kb)
        ids = {r["id"] for r in out.nodes.collect()}
        assert data_node_id("style") in ids

    def test_sink_removed(self, spark, g):
        # "vaswani" connects only to shyamalan -> degree 1 -> removed (Alg. 2)
        kb = _kb(spark, [("shyamalan", "vaswani")])
        out = expand_graph(g, kb)
        ids = {r["id"] for r in out.nodes.collect()}
        assert data_node_id("vaswani") not in ids

    def test_sink_scope_none_keeps(self, spark, g):
        kb = _kb(spark, [("shyamalan", "vaswani")])
        out = expand_graph(g, kb, sink_scope="none")
        ids = {r["id"] for r in out.nodes.collect()}
        assert data_node_id("vaswani") in ids

    def test_sink_scope_all_prunes_corpus_sinks(self, spark, g):
        kb = _kb(spark, [("shyamalan", "vaswani")])
        out_added = expand_graph(g, kb, sink_scope="added")
        out_all = expand_graph(g, kb, sink_scope="all")
        assert out_all.num_nodes() <= out_added.num_nodes()

    def test_bad_scope_raises(self, spark, g):
        with pytest.raises(ValueError):
            expand_graph(g, _kb(spark, [("a", "b")]), sink_scope="woof")

    def test_unrelated_kb_noop(self, spark, g):
        kb = _kb(spark, [("zzz", "yyy")])
        out = expand_graph(g, kb)
        assert out.num_nodes() == g.num_nodes()
        assert out.num_edges() == g.num_edges()

    def test_monotone_before_cleanup(self, spark, g):
        kb = _kb(spark, [("tarantino", "comedy"), ("drama", "comedy")])
        out = expand_graph(g, kb, sink_scope="none")
        in_edges = {(r["src"], r["dst"]) for r in g.edges.collect()}
        out_edges = {(r["src"], r["dst"]) for r in out.edges.collect()}
        assert in_edges <= out_edges

    def test_metadata_untouched(self, spark, g):
        kb = _kb(spark, [("tarantino", "comedy")])
        out = expand_graph(g, kb)
        want = {r["id"] for r in g.metadata_nodes().collect()}
        got = {r["id"] for r in out.metadata_nodes().collect()}
        assert want == got

    def test_no_self_relations(self, spark, g):
        kb = _kb(spark, [("tarantino", "tarantino")])
        out = expand_graph(g, kb)
        assert out.num_edges() == g.num_edges()

    def test_shortens_paths(self, spark, g):
        """The §III-A promise: expansion shortens metadata-metadata paths."""
        from repro.core.compress import bfs_parents

        kb = _kb(spark, [("tarantino", "comedy")])
        out = expand_graph(g, kb)
        d0, _ = bfs_parents(g.adjacency(), "s::1")
        d1, _ = bfs_parents(out.adjacency(), "s::1")
        assert d1["t::1"] <= d0["t::1"]
