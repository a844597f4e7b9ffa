"""Synthetic Snopes / Politifact scenarios (paper §V-C, Tables IV & V):
matching check-worthy claims against a corpus of verified claims (facts).

Paper data → our build (DESIGN.md §3): Snopes pairs 1k tweets with 11k
verified claims; Politifact pairs 768 politician claims with 16.6k verified
claims. Both corpora are *generic English* — the regime where pre-trained
models shine and the supervised reranker (RANK*) beats the unsupervised
methods. We generate facts from the general vocabulary organised in topics
(so ConceptNet-style expansion has real related-word edges) and derive each
claim by paraphrasing a fact (synonym swaps from ``SYNONYM_GROUPS``, word
dropout, reordering, filler). Politifact uses a larger fact pool and a more
aggressive paraphraser than Snopes, reproducing its lower absolute scores.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.graph import TextCorpus
from .common import (
    GENERAL_WORDS,
    SYNONYM_GROUPS,
    make_names,
    make_words,
    paraphrase,
    pick,
    sample_k,
)


@dataclass
class ClaimsScenario:
    claims: TextCorpus
    facts: TextCorpus
    truth: DataFrame  # (query = claim id, target = fact id)
    kb: pd.DataFrame
    synonyms: pd.DataFrame
    claims_pdf: pd.DataFrame
    facts_pdf: pd.DataFrame


def _topics(rng: np.random.Generator, n_topics: int, size: int) -> List[List[str]]:
    return [sample_k(rng, GENERAL_WORDS, size) for _ in range(n_topics)]


def _make_fact(
    rng: np.random.Generator, topic: List[str], person: str
) -> str:
    """A verified claim: one named person + mostly topic-internal words.

    Few topics + high topic proportion means facts collide heavily on
    vocabulary, as real fact-check corpora do (many claims about the same
    politician and subject) — this is what keeps lexical matching from
    being a free win.
    """
    words = [person.lower()]
    n = int(rng.integers(8, 16))
    words += [pick(rng, topic) if rng.random() < 0.75 else pick(rng, GENERAL_WORDS) for _ in range(n)]
    if rng.random() < 0.4:
        words.append(str(int(rng.integers(2, 9999))))
    return " ".join(words)


def _generate(
    spark: SparkSession,
    *,
    name: str,
    n_claims: int,
    n_facts: int,
    drop: float,
    swap: float,
    n_filler: int,
    dup_frac: float,
    seed: int,
) -> ClaimsScenario:
    rng = np.random.default_rng(seed)
    people = make_names(rng, max(12, n_facts // 60))
    topics = _topics(rng, 8, 40)

    facts: List[dict] = []
    fact_meta: List[tuple] = []  # (topic idx, person) for sibling generation
    for fid in range(1, n_facts + 1):
        ti = int(rng.integers(len(topics)))
        person = people[int(rng.integers(len(people)))]
        facts.append({"fid": fid, "text": _make_fact(rng, topics[ti], person)})
        fact_meta.append((ti, person))
    facts_pdf = pd.DataFrame(facts)

    claim_rows, truth_rows, extra_facts = [], [], []
    fact_ids = list(rng.choice(n_facts, size=n_claims, replace=False) + 1)
    next_fid = n_facts
    for cid, fid in enumerate(sorted(int(f) for f in fact_ids), start=1):
        fact_tokens = facts_pdf.loc[facts_pdf.fid == fid, "text"].iloc[0].split()
        tokens = paraphrase(
            rng, fact_tokens, drop_prob=drop, swap_prob=swap, shuffle=True,
            filler=GENERAL_WORDS, n_filler=n_filler,
        )
        claim_rows.append({"cid": cid, "text": " ".join(tokens)})
        truth_rows.append({"query": cid, "target": fid})
        # hard negatives: sibling facts about the same person and topic
        ti, person = fact_meta[fid - 1]
        for _ in range(int(rng.integers(2, 5))):
            next_fid += 1
            extra_facts.append(
                {"fid": next_fid, "text": _make_fact(rng, topics[ti], person)}
            )
        if rng.random() < dup_frac:  # a second verified claim for the same event
            next_fid += 1
            dup = paraphrase(rng, fact_tokens, drop_prob=0.1, swap_prob=0.3)
            extra_facts.append({"fid": next_fid, "text": " ".join(dup)})
            truth_rows.append({"query": cid, "target": next_fid})
    if extra_facts:
        facts_pdf = pd.concat([facts_pdf, pd.DataFrame(extra_facts)], ignore_index=True)
    claims_pdf = pd.DataFrame(claim_rows)
    truth_pdf = pd.DataFrame(truth_rows)

    kb_rows = [(g[i], g[j]) for g in SYNONYM_GROUPS for i in range(len(g)) for j in range(i + 1, len(g))]
    for topic in topics:  # related-word edges inside a topic
        for i in range(0, len(topic) - 1, 3):
            kb_rows.append((topic[i], topic[i + 1]))
    junk = make_words(rng, 30)
    kb_rows += [(junk[j], junk[j + 1]) for j in range(0, len(junk) - 1, 2)]
    kb = pd.DataFrame(kb_rows, columns=["subject", "object"]).drop_duplicates()

    syn_rows = [(w, g[0]) for g in SYNONYM_GROUPS for w in g[1:]]
    synonyms = pd.DataFrame(syn_rows, columns=["variant", "canonical"])

    claims = TextCorpus(f"{name}_claims", spark.createDataFrame(claims_pdf), "cid", "text")
    facts = TextCorpus(f"{name}_facts", spark.createDataFrame(facts_pdf), "fid", "text")
    truth = spark.createDataFrame(truth_pdf)
    return ClaimsScenario(
        claims=claims, facts=facts, truth=truth, kb=kb, synonyms=synonyms,
        claims_pdf=claims_pdf, facts_pdf=facts_pdf,
    )


def generate_snopes(spark: SparkSession, *, scale: float = 1.0, seed: int = 17) -> ClaimsScenario:
    return _generate(
        spark, name="snopes",
        n_claims=max(15, int(150 * scale)), n_facts=max(80, int(1500 * scale)),
        drop=0.3, swap=0.5, n_filler=3, dup_frac=0.15, seed=seed,
    )


def generate_politifact(spark: SparkSession, *, scale: float = 1.0, seed: int = 19) -> ClaimsScenario:
    return _generate(
        spark, name="politi",
        n_claims=max(12, int(120 * scale)), n_facts=max(100, int(2200 * scale)),
        drop=0.45, swap=0.8, n_filler=6, dup_frac=0.05, seed=seed,
    )
