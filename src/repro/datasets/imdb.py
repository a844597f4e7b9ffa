"""Synthetic IMDb scenario (paper §V-A, Table I): text-to-data matching of
movie reviews against a movie relation.

What the paper used → what we build (DESIGN.md §3): the real scenario pairs
2k hand-matched reviews with 50k IMDb tuples, in two variants — WT (13
attributes incl. title) and NT (title removed). We generate a movie relation
from a domain vocabulary (titles, person names, genres) and two reviews per
target movie that reference the movie through *indirect, noisy* signals:
abbreviated actor names ("B. Willis" vs the table's "Bruce Willis"), genre
near-synonyms (review says *farce*, table says *Comedy*), director mentions,
title words (useful only in WT), release year, plus general-word filler and
a distractor mention of another movie's actor. This preserves exactly the
matching difficulty the paper evaluates: vocabulary mismatch bridged by
graph structure, node merging and KB expansion.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.graph import TableCorpus, TextCorpus
from .common import GENERAL_WORDS, make_names, make_words, pick, sample_k

GENRES = [
    "Thriller", "Drama", "Comedy", "Horror", "Romance", "Western", "Mystery", "Musical",
]
# near-synonyms the reviews use; the KB/synonym dictionary connects them
GENRE_SYNONYM = {
    "Thriller": "suspense", "Drama": "tragedy", "Comedy": "farce",
    "Horror": "chiller", "Romance": "lovestory", "Western": "frontier",
    "Mystery": "whodunit", "Musical": "songfest",
}
RATINGS = ["G", "PG", "PG-13", "R", "NC-17"]


@dataclass
class ImdbScenario:
    movies_wt: TableCorpus  # with title
    movies_nt: TableCorpus  # no title
    reviews: TextCorpus
    truth: DataFrame  # (query = review id, target = movie id)
    kb: pd.DataFrame  # raw-term KB triples (subject, object), un-stemmed
    synonyms: pd.DataFrame  # (variant, canonical) raw terms, un-stemmed
    movies_pdf: pd.DataFrame
    reviews_pdf: pd.DataFrame


def _person_pool(rng: np.random.Generator, n: int) -> List[Dict[str, str]]:
    firsts = make_names(rng, max(8, n // 3))
    lasts = make_names(rng, n)
    nicks = make_names(rng, n)  # press nicknames share no token with the name
    return [
        {"first": pick(rng, firsts), "last": lasts[i], "nick": nicks[i]}
        for i in range(n)
    ]


def generate(spark: SparkSession, *, scale: float = 1.0, seed: int = 7) -> ImdbScenario:
    rng = np.random.default_rng(seed)
    n_movies = max(24, int(400 * scale))
    n_targets = max(12, int(120 * scale))
    directors = _person_pool(rng, max(10, n_movies // 5))
    actors = _person_pool(rng, max(14, int(n_movies * 0.4)))
    title_vocab = make_words(rng, max(40, int(n_movies * 0.9)))

    movies = []
    used_titles = set()
    for mid in range(1, n_movies + 1):
        while True:
            title = " ".join(sample_k(rng, title_vocab, int(rng.integers(1, 4))))
            if title not in used_titles:
                used_titles.add(title)
                break
        a1, a2 = sample_k(rng, actors, 2)
        d = pick(rng, directors)
        movies.append(
            {
                "mid": mid,
                "title": title.title(),
                "director": f"{d['first']} {d['last']}",
                "actor1": f"{a1['first']} {a1['last']}",
                "actor2": f"{a2['first']} {a2['last']}",
                "genre": pick(rng, GENRES),
                "rating": pick(rng, RATINGS),
                "year": int(rng.integers(1960, 2021)),
            }
        )
    movies_pdf = pd.DataFrame(movies)

    nick_of = {f"{p['first']} {p['last']}": p["nick"] for p in actors + directors}

    def mention_person(full: str) -> str:
        # reviews rarely use the table's exact form: abbreviations
        # ("B. Willis"), bare surnames, and token-disjoint nicknames that
        # only the synonym resource can bridge (§II-C)
        first, last = full.split()
        r = rng.random()
        if r < 0.5:
            return nick_of[full]
        if r < 0.75:
            return f"{first[0]}. {last}"  # "B. Willis"
        if r < 0.9:
            return last
        return full

    reviews = []
    target_ids = sorted(rng.choice(n_movies, size=n_targets, replace=False) + 1)
    rid = 0
    for mid in target_ids:
        m = movies_pdf.loc[movies_pdf.mid == mid].iloc[0]
        for _ in range(2):
            rid += 1
            parts: List[str] = []
            parts.append(mention_person(pick(rng, [m.actor1, m.actor2])))
            if rng.random() < 0.55:
                parts.append(mention_person(m.director))
            if rng.random() < 0.35:
                parts.append(m.title)
            r = rng.random()
            if r < 0.3:
                parts.append(m.genre.lower())
            elif r < 0.8:
                parts.append(GENRE_SYNONYM[m.genre])
            if rng.random() < 0.25:
                # "released around": fuzzed year defeats exact lexical match
                parts.append(str(int(m.year) + int(rng.integers(-1, 2))))
            if rng.random() < 0.3:
                parts.append(f"rated {m.rating}")
            for _ in range(int(rng.integers(0, 3))):  # other movies' people
                other = movies_pdf.iloc[int(rng.integers(n_movies))]
                parts.append(mention_person(other.actor1))
            filler = sample_k(rng, GENERAL_WORDS, int(rng.integers(12, 30)))
            words: List[str] = []
            for p in parts:
                words.extend(p.split())
                words.extend(sample_k(rng, filler, min(3, len(filler))))
            reviews.append({"rid": rid, "text": " ".join(words), "mid": int(mid)})
    reviews_pdf = pd.DataFrame(reviews)

    # ---- external resources ------------------------------------------------
    kb_rows: List[tuple] = []
    spouse_words = make_words(rng, n_movies)
    for i, m in movies_pdf.iterrows():
        a1l, a2l = m.actor1.split()[1], m.actor2.split()[1]
        dl = m.director.split()[1]
        # starringOf(actor, title word): the key external fact — it bridges
        # title mentions in reviews to the NT relation that lacks the title
        for t in m.title.split():
            kb_rows.append((a1l, t.lower()))
            if rng.random() < 0.5:
                kb_rows.append((a2l, t.lower()))
            if rng.random() < 0.5:
                kb_rows.append((dl, t.lower()))  # directorOf
        if rng.random() < 0.3:
            kb_rows.append((a1l, a2l))  # costar
        if rng.random() < 0.5:
            kb_rows.append((dl, spouse_words[i]))  # spouse -> sink after cleanup
    # genre near-synonyms live ONLY in the KB: expansion is what connects a
    # review's "farce" to the table's "Comedy" (paper's style(...) example)
    for g, syn in GENRE_SYNONYM.items():
        kb_rows.append((g.lower(), syn))
    junk = make_words(rng, 60)
    for j in range(0, len(junk) - 1, 2):  # unrelated noise triples
        kb_rows.append((junk[j], junk[j + 1]))
    kb = pd.DataFrame(kb_rows, columns=["subject", "object"]).drop_duplicates()

    syn_rows = []
    for p in actors + directors:
        full = f"{p['first']} {p['last']}".lower()
        abbr = f"{p['first'][0]} {p['last']}".lower()
        syn_rows.append((abbr, full))  # "b willis" -> "bruce willis"
        syn_rows.append((full, p["last"].lower()))  # full name -> surname
        syn_rows.append((p["nick"].lower(), p["last"].lower()))  # nickname
    synonyms = pd.DataFrame(syn_rows, columns=["variant", "canonical"]).drop_duplicates()

    wt_attrs = ["title", "director", "actor1", "actor2", "genre", "rating", "year"]
    movies_sdf = spark.createDataFrame(movies_pdf)
    reviews_sdf = spark.createDataFrame(reviews_pdf[["rid", "text"]])
    truth = spark.createDataFrame(
        reviews_pdf[["rid", "mid"]].rename(columns={"rid": "query", "mid": "target"})
    )
    return ImdbScenario(
        movies_wt=TableCorpus("movies", movies_sdf, "mid", wt_attrs),
        movies_nt=TableCorpus("movies", movies_sdf, "mid", [a for a in wt_attrs if a != "title"]),
        reviews=TextCorpus("reviews", reviews_sdf, "rid", "text"),
        truth=truth,
        kb=kb,
        synonyms=synonyms,
        movies_pdf=movies_pdf,
        reviews_pdf=reviews_pdf,
    )
