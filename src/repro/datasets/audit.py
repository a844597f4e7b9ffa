"""Synthetic Audit scenario (paper §V-B, Table III): matching enterprise
text documents to nodes of a topic taxonomy (text to structured text).

Paper data → our build (DESIGN.md §3): the real scenario is a proprietary
KPMG corpus — 1622 audit documents (1–17 sentences) matched by experts to a
747-concept taxonomy with root-to-leaf paths of length 2–5; 40% of documents
carry one concept, 10% two, the rest three to 27 (avg four). We generate a
taxonomy over a *domain-specific* audit vocabulary (pseudo-words plus a few
audit nouns, none covered by the general background model) and documents
whose sentences sample words from their gold concepts' labels and ancestors
plus filler. This preserves: hierarchy edges between metadata nodes (§II-A),
multi-label ground truth at path granularity, and the pre-trained-model
blindness that makes D2VEC beat S-BE in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.graph import StructuredTextCorpus, TextCorpus
from .common import GENERAL_WORDS, make_words, pick, sample_k

AUDIT_NOUNS = [
    "audit", "risk", "control", "compliance", "assurance", "procedure",
    "materiality", "sampling", "evidence", "disclosure", "ledger", "valuation",
]


@dataclass
class AuditScenario:
    taxonomy: StructuredTextCorpus
    docs: TextCorpus
    truth: DataFrame  # (query = doc id, target = concept id)
    kb: pd.DataFrame
    synonyms: pd.DataFrame
    taxonomy_pdf: pd.DataFrame  # (concept_id, label, parent_id)
    docs_pdf: pd.DataFrame


def generate(spark: SparkSession, *, scale: float = 1.0, seed: int = 13) -> AuditScenario:
    rng = np.random.default_rng(seed)
    n_areas = max(3, int(6 * min(1.0, scale + 0.3)))
    per_area = max(3, int(6 * scale))
    domain = make_words(rng, max(60, int(160 * scale)))

    concepts: List[dict] = []
    cid = 0

    def add(label: str, parent: int | None) -> int:
        nonlocal cid
        cid += 1
        concepts.append({"concept_id": cid, "label": label, "parent_id": parent})
        return cid

    root = add("audit framework", None)
    area_words = sample_k(rng, domain, n_areas)
    for aw in area_words:
        area = add(f"{aw} {pick(rng, AUDIT_NOUNS)}", root)
        for _ in range(per_area):
            w1, w2 = sample_k(rng, domain, 2)
            c2 = add(f"{w1} {w2} {pick(rng, AUDIT_NOUNS)}", area)
            for _ in range(int(rng.integers(0, 3))):
                w3, w4 = sample_k(rng, domain, 2)
                c3 = add(f"{w3} {w4}", c2)
                if rng.random() < 0.3:
                    w5 = pick(rng, domain)
                    add(f"{w5} {pick(rng, AUDIT_NOUNS)}", c3)
    taxonomy_pdf = pd.DataFrame(concepts)
    # leaves and mid nodes (exclude root + areas, the two most-general levels
    # the Node score also excludes)
    assignable = taxonomy_pdf[~taxonomy_pdf.concept_id.isin([root] + list(taxonomy_pdf[taxonomy_pdf.parent_id == root].concept_id))]

    label_of = dict(zip(taxonomy_pdf.concept_id, taxonomy_pdf.label))
    parent_of = dict(zip(taxonomy_pdf.concept_id, taxonomy_pdf.parent_id))

    def concept_words(c: int) -> List[str]:
        words: List[str] = []
        cur, hops = c, 0
        while cur is not None and not pd.isna(cur) and hops < 8:
            words.extend(label_of[int(cur)].split())
            cur = parent_of.get(int(cur))
            hops += 1
        return words

    n_docs = max(40, int(320 * scale))
    doc_rows, truth_rows = [], []
    ids = list(assignable.concept_id)
    for did in range(1, n_docs + 1):
        r = rng.random()
        if r < 0.4:
            n_lab = 1
        elif r < 0.5:
            n_lab = 2
        else:
            n_lab = int(rng.integers(3, 9))
        labels = sample_k(rng, ids, n_lab)
        sentences = []
        for _ in range(int(rng.integers(1, 7))):
            c = pick(rng, labels)
            cw = concept_words(int(c))
            words = sample_k(rng, cw, min(len(cw), int(rng.integers(2, 5))))
            words += sample_k(rng, domain, 2)  # domain filler
            words += sample_k(rng, GENERAL_WORDS, int(rng.integers(3, 8)))
            rng.shuffle(words)
            sentences.append(" ".join(words))
        doc_rows.append({"did": did, "text": ". ".join(sentences)})
        truth_rows.extend({"query": did, "target": int(c)} for c in set(labels))
    docs_pdf = pd.DataFrame(doc_rows)
    truth_pdf = pd.DataFrame(truth_rows)

    # ConceptNet-style resource: sibling-concept relatedness + noise
    kb_rows: List[Tuple[str, str]] = []
    for _, grp in taxonomy_pdf.groupby("parent_id", dropna=True):
        sib = list(grp.label)
        for i in range(len(sib) - 1):
            a = sib[i].split()[0]
            b = sib[i + 1].split()[0]
            if a != b:
                kb_rows.append((a, b))
    for w in sample_k(rng, domain, len(domain) // 3):
        kb_rows.append((w, pick(rng, AUDIT_NOUNS)))
    junk = make_words(rng, 40)
    kb_rows += [(junk[j], junk[j + 1]) for j in range(0, len(junk) - 1, 2)]
    kb = pd.DataFrame(kb_rows, columns=["subject", "object"]).drop_duplicates()

    # domain-specific terms have no useful pre-trained synonyms (paper §V-F2
    # reports merging with pre-trained resources does NOT help on Audit)
    synonyms = pd.DataFrame(columns=["variant", "canonical"])

    taxonomy = StructuredTextCorpus(
        "tax", spark.createDataFrame(taxonomy_pdf), "concept_id", "label", "parent_id"
    )
    docs = TextCorpus("docs", spark.createDataFrame(docs_pdf), "did", "text")
    truth = spark.createDataFrame(truth_pdf)
    return AuditScenario(
        taxonomy=taxonomy, docs=docs, truth=truth, kb=kb, synonyms=synonyms,
        taxonomy_pdf=taxonomy_pdf, docs_pdf=docs_pdf,
    )
