"""Tests for the synthetic scenario generators (DESIGN.md §3)."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import audit, claims, common, corona, imdb, sts


class TestCommon:
    def test_make_words_distinct(self):
        rng = np.random.default_rng(0)
        ws = common.make_words(rng, 50)
        assert len(set(ws)) == 50

    def test_make_words_disjoint_from_general(self):
        rng = np.random.default_rng(1)
        ws = common.make_words(rng, 100)
        assert not set(ws) & set(common.GENERAL_WORDS)

    def test_make_words_deterministic(self):
        a = common.make_words(np.random.default_rng(7), 10)
        b = common.make_words(np.random.default_rng(7), 10)
        assert a == b

    def test_make_names_capitalized(self):
        rng = np.random.default_rng(2)
        for n in common.make_names(rng, 10):
            assert n[0].isupper()

    def test_synonym_groups_within_vocab_shape(self):
        for g in common.SYNONYM_GROUPS:
            assert len(g) >= 2

    def test_synonym_of_identity_for_unknown(self):
        rng = np.random.default_rng(0)
        assert common.synonym_of(rng, "zzz") == "zzz"

    def test_synonym_of_stays_in_group(self):
        rng = np.random.default_rng(0)
        for _ in range(20):
            assert common.synonym_of(rng, "big") in {"big", "large", "huge"}

    def test_paraphrase_keeps_content(self):
        rng = np.random.default_rng(0)
        out = common.paraphrase(rng, ["alpha", "beta", "gamma"], drop_prob=0.0, swap_prob=0.0)
        assert out == ["alpha", "beta", "gamma"]

    def test_paraphrase_never_empty(self):
        rng = np.random.default_rng(0)
        for _ in range(20):
            assert common.paraphrase(rng, ["alpha"], drop_prob=0.99)


class TestImdb:
    @pytest.fixture(scope="class")
    def sc(self, spark):
        return imdb.generate(spark, scale=0.05, seed=7)

    def test_two_reviews_per_target(self, sc):
        counts = sc.reviews_pdf.groupby("mid").size()
        assert (counts == 2).all()

    def test_truth_covers_all_reviews(self, sc):
        assert sc.truth.count() == len(sc.reviews_pdf)

    def test_nt_drops_title(self, sc):
        assert "title" in sc.movies_wt.attr_cols
        assert "title" not in sc.movies_nt.attr_cols

    def test_titles_unique(self, sc):
        assert sc.movies_pdf["title"].is_unique

    def test_kb_has_genre_synonyms(self, sc):
        pairs = set(zip(sc.kb["subject"], sc.kb["object"]))
        assert ("comedy", "farce") in pairs

    def test_synonyms_cover_nicknames(self, sc):
        # every review nickname token maps to some surname
        assert (sc.synonyms["canonical"].str.split().str.len() <= 2).all()

    def test_deterministic(self, spark):
        a = imdb.generate(spark, scale=0.05, seed=7)
        b = imdb.generate(spark, scale=0.05, seed=7)
        pd.testing.assert_frame_equal(a.movies_pdf, b.movies_pdf)
        pd.testing.assert_frame_equal(a.reviews_pdf, b.reviews_pdf)

    def test_scale_grows(self, spark):
        small = imdb.generate(spark, scale=0.05, seed=7)
        big = imdb.generate(spark, scale=0.2, seed=7)
        assert len(big.movies_pdf) > len(small.movies_pdf)


class TestCorona:
    @pytest.fixture(scope="class")
    def sc(self, spark):
        return corona.generate(spark, scale=0.3, seed=11)

    def test_table_key_coverage(self, sc):
        assert sc.table_pdf["tid"].is_unique

    def test_gen_truth_valid_tids(self, sc):
        tids = set(sc.table_pdf["tid"])
        for r in sc.truth_gen.collect():
            assert r["target"] in tids

    def test_usr_truth_valid_tids(self, sc):
        tids = set(sc.table_pdf["tid"])
        for r in sc.truth_usr.collect():
            assert r["target"] in tids

    def test_gen_sentence_value_mix(self, sc):
        # ~40% of Gen sentences quote the exact value; the rest round it
        # (that ambiguity is what makes bucketing matter, §II-C)
        gen = {r["sid"]: r["text"] for r in sc.gen.df.collect()}
        truth = {r["query"]: r["target"] for r in sc.truth_gen.collect()}
        tbl = sc.table_pdf.set_index("tid")
        hits = sum(str(tbl.loc[t, "value"]) in gen[s] for s, t in truth.items())
        assert 0.15 < hits / len(truth) < 0.75

    def test_typos_in_synonyms(self, sc):
        variants = set(sc.synonyms["variant"])
        assert any(v not in corona.COUNTRIES for v in variants)

    def test_numeric_share(self, sc):
        from repro.core.preprocess import is_numeric

        toks = set()
        for t in sc.table_pdf.itertuples():
            toks.update(str(t.value).split())
        assert all(is_numeric(x) for x in toks)


class TestAudit:
    @pytest.fixture(scope="class")
    def sc(self, spark):
        return audit.generate(spark, scale=0.3, seed=13)

    def test_single_root(self, sc):
        roots = sc.taxonomy_pdf[sc.taxonomy_pdf["parent_id"].isna()]
        assert len(roots) == 1

    def test_parents_exist(self, sc):
        ids = set(sc.taxonomy_pdf["concept_id"])
        for p in sc.taxonomy_pdf["parent_id"].dropna():
            assert int(p) in ids

    def test_path_depth_range(self, sc):
        from repro.core.metrics import root_to_node_paths

        paths = root_to_node_paths(sc.taxonomy_pdf)
        depths = {len(p) for p in paths.values()}
        assert min(depths) == 1 and max(depths) <= 5

    def test_label_distribution(self, sc):
        per_doc = sc.truth.toPandas().groupby("query").size()
        assert (per_doc >= 1).all()
        assert per_doc.max() <= 8
        # roughly 40% single-label (generator draws with prob 0.4)
        frac1 = (per_doc == 1).mean()
        assert 0.2 < frac1 < 0.6

    def test_truth_targets_not_root_or_areas(self, sc):
        root = sc.taxonomy_pdf.loc[sc.taxonomy_pdf.parent_id.isna(), "concept_id"].iloc[0]
        areas = set(sc.taxonomy_pdf.loc[sc.taxonomy_pdf.parent_id == root, "concept_id"])
        for r in sc.truth.collect():
            assert r["target"] != root and r["target"] not in areas


class TestClaims:
    @pytest.fixture(scope="class")
    def sn(self, spark):
        return claims.generate_snopes(spark, scale=0.08, seed=17)

    def test_every_claim_has_truth(self, sn):
        q = {r["query"] for r in sn.truth.collect()}
        assert q == set(sn.claims_pdf["cid"])

    def test_facts_unique_ids(self, sn):
        assert sn.facts_pdf["fid"].is_unique

    def test_some_multi_relevant(self, sn):
        per = sn.truth.toPandas().groupby("query").size()
        assert per.max() >= 1  # duplicates are probabilistic at tiny scale

    def test_politifact_bigger_pool(self, spark):
        sn = claims.generate_snopes(spark, scale=0.08, seed=17)
        pf = claims.generate_politifact(spark, scale=0.08, seed=19)
        assert len(pf.facts_pdf) > len(sn.facts_pdf) * 1.1

    def test_claim_overlaps_fact(self, sn):
        """A claim shares at least one content token with its fact."""
        from repro.core.preprocess import content_tokens

        facts = dict(zip(sn.facts_pdf["fid"], sn.facts_pdf["text"]))
        claims_txt = dict(zip(sn.claims_pdf["cid"], sn.claims_pdf["text"]))
        truth = sn.truth.toPandas()
        ok = 0
        for q, t in zip(truth["query"], truth["target"]):
            a = set(content_tokens(claims_txt[q]))
            b = set(content_tokens(facts[t]))
            ok += bool(a & b)
        assert ok / len(truth) > 0.9


class TestSts:
    @pytest.fixture(scope="class")
    def sc(self, spark):
        return sts.generate(spark, scale=0.15, seed=23)

    def test_pair_alignment(self, sc):
        assert list(sc.scores["lid"]) == list(sc.scores["rid"])

    def test_score_range(self, sc):
        assert sc.scores["score"].between(0, 5).all()

    def test_threshold_monotone(self, spark, sc):
        t2 = sc.truth(spark, k=2).count()
        t3 = sc.truth(spark, k=3).count()
        assert t3 <= t2

    def test_high_score_more_overlap(self, sc):
        from repro.core.preprocess import content_tokens

        left = dict(zip(sc.left_pdf["lid"], sc.left_pdf["text"]))
        right = dict(zip(sc.right_pdf["rid"], sc.right_pdf["text"]))

        def overlap(i):
            a = set(content_tokens(left[i]))
            b = set(content_tokens(right[i]))
            return len(a & b) / max(1, len(a))

        lo = [overlap(r.lid) for r in sc.scores.itertuples() if r.score <= 1]
        hi = [overlap(r.lid) for r in sc.scores.itertuples() if r.score >= 4]
        assert np.mean(hi) > np.mean(lo) + 0.2
