"""Synthetic STS scenario (paper §V-C, Table VI): semantic textual
similarity pairs turned into an unsupervised matching task.

Paper data → our build (DESIGN.md §3): the GLUE STS benchmark has 7k
sentence pairs scored 0 (dissimilar) to 5 (equivalent); the paper treats a
pair as a true match when its score ≥ k and reports k = 2 and k = 3. We
generate pairs where the right sentence keeps a score-proportional fraction
of the left sentence's content words (with synonym swaps at high scores)
and pads the rest with unrelated words — graded overlap exactly mirroring
the score scale. Higher k ⇒ more overlap among the positives ⇒ easier, as
in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.graph import TextCorpus
from .common import GENERAL_WORDS, SYNONYM_GROUPS, make_words, paraphrase, pick, sample_k


@dataclass
class StsScenario:
    left: TextCorpus
    right: TextCorpus
    scores: pd.DataFrame  # (lid, rid, score 0..5)
    kb: pd.DataFrame
    synonyms: pd.DataFrame
    left_pdf: pd.DataFrame
    right_pdf: pd.DataFrame

    def truth(self, spark: SparkSession, *, k: int) -> DataFrame:
        """Pairs with score ≥ k as (query, target) ground truth."""
        pos = self.scores[self.scores["score"] >= k]
        return spark.createDataFrame(
            pos.rename(columns={"lid": "query", "rid": "target"})[["query", "target"]]
        )


def generate(spark: SparkSession, *, scale: float = 1.0, seed: int = 23) -> StsScenario:
    rng = np.random.default_rng(seed)
    n_pairs = max(60, int(700 * scale))
    # topical sentences: non-kept words are re-drawn from the SAME topic, so
    # the right corpus collides heavily inside a topic and graded overlap is
    # the only reliable signal (like real STS, where distractors are
    # same-domain captions/headlines)
    n_topics = 8
    topics = [GENERAL_WORDS[i::n_topics] for i in range(n_topics)]
    lefts, rights, scores = [], [], []
    for i in range(1, n_pairs + 1):
        topic = topics[int(rng.integers(n_topics))]
        base = [
            pick(rng, topic) if rng.random() < 0.8 else pick(rng, GENERAL_WORDS)
            for _ in range(int(rng.integers(8, 15)))
        ]
        score = int(rng.integers(0, 6))
        keep = score / 5.0
        kept = [w for w in base if rng.random() < keep]
        other = [pick(rng, topic) for _ in range(max(1, len(base) - len(kept)))]
        right = paraphrase(
            rng, kept + other, drop_prob=0.0, swap_prob=0.3 if score >= 3 else 0.0,
            shuffle=True,
        )
        lefts.append({"lid": i, "text": " ".join(base)})
        rights.append({"rid": i, "text": " ".join(right)})
        scores.append({"lid": i, "rid": i, "score": score})
    left_pdf, right_pdf = pd.DataFrame(lefts), pd.DataFrame(rights)
    scores_pdf = pd.DataFrame(scores)

    kb_rows = [(g[i], g[j]) for g in SYNONYM_GROUPS for i in range(len(g)) for j in range(i + 1, len(g))]
    junk = make_words(rng, 24)
    kb_rows += [(junk[j], junk[j + 1]) for j in range(0, len(junk) - 1, 2)]
    kb = pd.DataFrame(kb_rows, columns=["subject", "object"]).drop_duplicates()
    synonyms = pd.DataFrame(
        [(w, g[0]) for g in SYNONYM_GROUPS for w in g[1:]], columns=["variant", "canonical"]
    )

    return StsScenario(
        left=TextCorpus("sts_left", spark.createDataFrame(left_pdf), "lid", "text"),
        right=TextCorpus("sts_right", spark.createDataFrame(right_pdf), "rid", "text"),
        scores=scores_pdf,
        kb=kb,
        synonyms=synonyms,
        left_pdf=left_pdf,
        right_pdf=right_pdf,
    )
