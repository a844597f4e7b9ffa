"""Tests for MRR / MAP@k / HasPositive@k and the Table III path scores."""
import math

import pandas as pd
import pytest

from repro.core.metrics import (
    node_score,
    path_metrics,
    ranking_metrics,
    ranking_metrics_pdf,
    root_to_node_paths,
)


def _ranked(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["query", "target", "rank"]))


def _truth(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=["query", "target"]))


class TestRankingMetricsSpark:
    def test_perfect_single(self, spark):
        m = ranking_metrics(
            _ranked(spark, [("q1", "t1", 1), ("q1", "t2", 2)]),
            _truth(spark, [("q1", "t1")]),
            ks=(1, 5),
        )
        assert m["MRR"] == 1.0
        assert m["MAP@1"] == 1.0
        assert m["HasPositive@1"] == 1.0

    def test_rank_two(self, spark):
        m = ranking_metrics(
            _ranked(spark, [("q1", "t2", 1), ("q1", "t1", 2)]),
            _truth(spark, [("q1", "t1")]),
            ks=(1, 5),
        )
        assert m["MRR"] == 0.5
        assert m["MAP@1"] == 0.0
        assert m["HasPositive@1"] == 0.0
        assert m["MAP@5"] == 0.5
        assert m["HasPositive@5"] == 1.0

    def test_unranked_query_scores_zero(self, spark):
        m = ranking_metrics(
            _ranked(spark, [("q1", "t1", 1)]),
            _truth(spark, [("q1", "t1"), ("q2", "t9")]),
            ks=(1,),
        )
        assert m["MRR"] == 0.5  # (1.0 + 0.0) / 2
        assert m["HasPositive@1"] == 0.5

    def test_multiple_relevant_ap(self, spark):
        # relevant at ranks 1 and 3 of 2 relevant: AP@5 = (1/1 + 2/3)/2
        m = ranking_metrics(
            _ranked(spark, [("q", "a", 1), ("q", "x", 2), ("q", "b", 3)]),
            _truth(spark, [("q", "a"), ("q", "b")]),
            ks=(5,),
        )
        assert m["MAP@5"] == pytest.approx((1 + 2 / 3) / 2)

    def test_map_truncation_denominator(self, spark):
        # 3 relevant but k=1: AP@1 = 1/ min(3,1) = 1 when hit at rank 1
        m = ranking_metrics(
            _ranked(spark, [("q", "a", 1)]),
            _truth(spark, [("q", "a"), ("q", "b"), ("q", "c")]),
            ks=(1,),
        )
        assert m["MAP@1"] == 1.0

    def test_empty_truth_raises(self, spark):
        with pytest.raises(Exception):
            ranking_metrics(
                _ranked(spark, [("q", "a", 1)]),
                _truth(spark, []),
                ks=(1,),
            )

    def test_mrr_against_oracle(self, spark):
        """Cross-check MRR with a DuckDB SQL formulation."""
        from repro.oracle import assert_equivalent

        ranked = [("q1", "a", 1), ("q1", "b", 2), ("q2", "b", 1), ("q2", "a", 2)]
        truth = [("q1", "b"), ("q2", "b")]
        m = ranking_metrics(_ranked(spark, ranked), _truth(spark, truth), ks=(1,))
        mrr_df = spark.createDataFrame(pd.DataFrame({"mrr": [m["MRR"]]}))
        sql = """
            SELECT AVG(rr) AS mrr FROM (
                SELECT t.query, COALESCE(1.0 / MIN(r.rank), 0.0) AS rr
                FROM (SELECT DISTINCT query FROM truth) t
                LEFT JOIN (
                    SELECT r.query, r.rank FROM ranked r
                    JOIN truth g ON r.query = g.query AND r.target = g.target
                ) r ON t.query = r.query
                GROUP BY t.query
            )
        """
        assert_equivalent(
            mrr_df,
            sql,
            ranked=pd.DataFrame(ranked, columns=["query", "target", "rank"]),
            truth=pd.DataFrame(truth, columns=["query", "target"]),
        )


class TestPandasSparkParity:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_random_inputs_agree(self, spark, seed):
        import numpy as np

        rng = np.random.default_rng(seed)
        queries = [f"q{i}" for i in range(8)]
        targets = [f"t{i}" for i in range(15)]
        ranked_rows = []
        for q in queries:
            perm = rng.permutation(targets)[:10]
            ranked_rows += [(q, t, r) for r, t in enumerate(perm, start=1)]
        truth_rows = [
            (q, targets[int(i)]) for q in queries for i in rng.choice(15, size=2, replace=False)
        ]
        ranked_pdf = pd.DataFrame(ranked_rows, columns=["query", "target", "rank"])
        truth_pdf = pd.DataFrame(truth_rows, columns=["query", "target"])
        m_spark = ranking_metrics(
            spark.createDataFrame(ranked_pdf), spark.createDataFrame(truth_pdf), ks=(1, 5)
        )
        m_pdf = ranking_metrics_pdf(ranked_pdf, truth_pdf, ks=(1, 5))
        for k in m_spark:
            assert m_spark[k] == pytest.approx(m_pdf[k]), k


TAX = pd.DataFrame(
    {
        "concept_id": [1, 2, 3, 4, 5],
        "label": ["root", "area", "a", "b", "c"],
        "parent_id": [None, 1, 2, 3, 2],
    }
)


class TestPaths:
    def test_root_to_node(self):
        paths = root_to_node_paths(TAX)
        assert paths["1"] == ("root",)
        assert paths["4"] == ("root", "area", "a", "b")

    def test_node_score_paper_example(self):
        # r1: a->b->c->d, r2: a->b->c; after excluding 2 levels:
        # r1': c->d, r2': c  => intersection 1 / max(2,1) = 0.5
        r1 = ("a", "b", "c", "d")
        r2 = ("a", "b", "c")
        assert node_score(r1, r2) == 0.5

    def test_node_score_identical(self):
        p = ("a", "b", "c", "d")
        assert node_score(p, p) == 1.0

    def test_node_score_disjoint_tails(self):
        assert node_score(("a", "b", "x"), ("a", "b", "y")) == 0.0

    def test_node_score_short_paths(self):
        assert node_score(("a", "b"), ("a", "b")) == 1.0
        assert node_score(("a", "b"), ("a", "c")) == 0.0

    def test_symmetry(self):
        p1, p2 = ("a", "b", "c", "d"), ("a", "b", "c", "e", "f")
        assert node_score(p1, p2) == node_score(p2, p1)


class TestPathMetrics:
    def setup_method(self):
        self.paths = root_to_node_paths(TAX)

    def test_exact_perfect(self):
        preds = pd.DataFrame({"query": ["d1"], "target": ["4"], "rank": [1]})
        truth = pd.DataFrame({"query": ["d1"], "target": ["4"]})
        m = path_metrics(preds, truth, self.paths, k=1, mode="exact")
        assert m == {"P": 1.0, "R": 1.0, "F": 1.0}

    def test_exact_miss(self):
        preds = pd.DataFrame({"query": ["d1"], "target": ["5"], "rank": [1]})
        truth = pd.DataFrame({"query": ["d1"], "target": ["4"]})
        m = path_metrics(preds, truth, self.paths, k=1, mode="exact")
        assert m["P"] == 0.0 and m["R"] == 0.0

    def test_node_partial(self):
        # pred 3 (root,area,a) vs truth 4 (root,area,a,b): tails (a) vs (a,b)
        preds = pd.DataFrame({"query": ["d1"], "target": ["3"], "rank": [1]})
        truth = pd.DataFrame({"query": ["d1"], "target": ["4"]})
        m = path_metrics(preds, truth, self.paths, k=1, mode="node")
        assert m["P"] == pytest.approx(0.5)
        assert m["R"] == pytest.approx(0.5)

    def test_k_truncates(self):
        preds = pd.DataFrame(
            {"query": ["d1", "d1"], "target": ["5", "4"], "rank": [1, 2]}
        )
        truth = pd.DataFrame({"query": ["d1"], "target": ["4"]})
        m1 = path_metrics(preds, truth, self.paths, k=1, mode="exact")
        m2 = path_metrics(preds, truth, self.paths, k=2, mode="exact")
        assert m1["R"] == 0.0 and m2["R"] == 1.0
        assert m2["P"] == 0.5

    def test_doc_without_predictions_counts(self):
        preds = pd.DataFrame({"query": ["d1"], "target": ["4"], "rank": [1]})
        truth = pd.DataFrame({"query": ["d1", "d2"], "target": ["4", "5"]})
        m = path_metrics(preds, truth, self.paths, k=1, mode="exact")
        assert m["P"] == 0.5 and m["R"] == 0.5

    def test_multilabel_recall(self):
        preds = pd.DataFrame({"query": ["d1"], "target": ["4"], "rank": [1]})
        truth = pd.DataFrame({"query": ["d1", "d1"], "target": ["4", "5"]})
        m = path_metrics(preds, truth, self.paths, k=1, mode="exact")
        assert m["P"] == 1.0
        assert m["R"] == 0.5

    def test_bad_mode(self):
        with pytest.raises(ValueError):
            path_metrics(pd.DataFrame(columns=["query", "target", "rank"]),
                         pd.DataFrame({"query": ["d"], "target": ["4"]}),
                         self.paths, k=1, mode="woof")

    def test_f_harmonic(self):
        preds = pd.DataFrame({"query": ["d1"], "target": ["4"], "rank": [1]})
        truth = pd.DataFrame({"query": ["d1", "d1"], "target": ["4", "5"]})
        m = path_metrics(preds, truth, self.paths, k=1, mode="exact")
        assert m["F"] == pytest.approx(2 * 1.0 * 0.5 / 1.5)
