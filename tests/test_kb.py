"""Tests for the KB/synonym term-space adapters."""
import pandas as pd
import pytest

from repro.kb.synth_kb import prepare_kb, prepare_synonyms, to_term


class TestToTerm:
    def test_multiword(self):
        assert to_term("Bruce Willis") == "bruce_willi"

    def test_stopwords_dropped(self):
        assert to_term("The Sixth Sense") == "sixth_sense"

    def test_no_stem(self):
        assert to_term("new cases", do_stem=False) == "new_cases"

    def test_stemmed(self):
        assert to_term("new cases") == "new_case"

    def test_empty(self):
        assert to_term("") == ""


class TestPrepareKb:
    def test_normalizes_both_sides(self, spark):
        kb = pd.DataFrame({"subject": ["Bruce Willis"], "object": ["Pulp Fiction"]})
        out = prepare_kb(spark, kb).collect()
        assert (out[0]["subject"], out[0]["object"]) == ("bruce_willi", "pulp_fiction")

    def test_drops_self_relations(self, spark):
        kb = pd.DataFrame({"subject": ["cases", "x"], "object": ["case", "y"]})
        out = prepare_kb(spark, kb).collect()
        # "cases" and "case" stem to the same term -> self relation dropped
        assert len(out) == 1

    def test_drops_empty(self, spark):
        kb = pd.DataFrame({"subject": ["the", "a b"], "object": ["of", "c"]})
        out = prepare_kb(spark, kb).collect()
        assert all(r["subject"] and r["object"] for r in out)

    def test_dedup(self, spark):
        kb = pd.DataFrame({"subject": ["x y", "X Y"], "object": ["z", "Z"]})
        assert prepare_kb(spark, kb).count() == 1


class TestPrepareSynonyms:
    def test_variant_keyed(self, spark):
        syn = pd.DataFrame({"variant": ["B Willis"], "canonical": ["Bruce Willis"]})
        out = prepare_synonyms(spark, syn).collect()
        assert out[0]["variant"] == "b_willi"
        assert out[0]["canonical"] == "bruce_willi"

    def test_empty_frame(self, spark):
        out = prepare_synonyms(spark, pd.DataFrame(columns=["variant", "canonical"]))
        assert out.count() == 0

    def test_duplicate_variants_resolved(self, spark):
        syn = pd.DataFrame(
            {"variant": ["aa bb", "aa bb"], "canonical": ["cc", "dd"]}
        )
        assert prepare_synonyms(spark, syn).count() == 1
