"""Synthetic CoronaCheck scenario (paper §V-A, Table II): matching COVID-19
claim sentences to tuples of an official statistics table.

Paper data → our build (DESIGN.md §3): the real scenario has ~1.2k tuples of
daily cases per country, ~7k sentences generated from the data (**Gen**) and
50 user-submitted sentences (**Usr**) with typos and free phrasing. We build
a (country × month × metric → value) table, template Gen sentences from
sampled rows, and produce Usr sentences by paraphrasing with misspelled
country names and rounded values. ~25% of graph data nodes end up numeric
(as the paper reports), which is what makes numeric bucketing (§II-C) and
the compression discussion (§V-D) meaningful here.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.graph import TableCorpus, TextCorpus
from .common import GENERAL_WORDS, make_words, pick, sample_k

COUNTRIES = [
    "china", "italy", "spain", "france", "germany", "iran", "brazil", "india",
    "russia", "turkey", "mexico", "peru", "chile", "canada", "japan", "sweden",
    "norway", "poland", "austria", "greece", "egypt", "kenya", "vietnam", "portugal",
]
CONTINENT = {
    "china": "asia", "india": "asia", "japan": "asia", "iran": "asia",
    "vietnam": "asia", "turkey": "asia", "russia": "europe", "italy": "europe",
    "spain": "europe", "france": "europe", "germany": "europe", "sweden": "europe",
    "norway": "europe", "poland": "europe", "austria": "europe", "greece": "europe",
    "portugal": "europe", "brazil": "samerica", "peru": "samerica",
    "chile": "samerica", "mexico": "namerica", "canada": "namerica",
    "egypt": "africa", "kenya": "africa",
}
MONTHS = [
    "january", "february", "march", "april", "may", "june", "july",
    "august", "september", "october", "november", "december",
]
METRICS = ["new cases", "total deaths", "recovered patients"]
METRIC_SYNONYM = {"cases": "infections", "deaths": "fatalities", "recovered": "healed"}
MONTH_ABBR = {m: m[:3] for m in MONTHS}

# deterministic misspellings for Usr sentences + the synonym dictionary
TYPOS = {c: [c[:-1] + c[-1] * 2, c[0] + c[2:3] + c[1:2] + c[3:]] for c in COUNTRIES}


@dataclass
class CoronaScenario:
    table: TableCorpus
    gen: TextCorpus
    usr: TextCorpus
    truth_gen: DataFrame
    truth_usr: DataFrame
    kb: pd.DataFrame
    synonyms: pd.DataFrame
    table_pdf: pd.DataFrame


def _say_value(rng: np.random.Generator, v: int, *, fuzzy: bool) -> str:
    if not fuzzy:
        return str(v)
    # users round ("about 1200"): keep 2 significant digits
    s = f"{v:.1e}"
    mant, exp = s.split("e")
    return str(int(float(mant) * 10 ** int(exp)))


def generate(spark: SparkSession, *, scale: float = 1.0, seed: int = 11) -> CoronaScenario:
    rng = np.random.default_rng(seed)
    n_countries = max(6, min(len(COUNTRIES), int(len(COUNTRIES) * scale)))
    countries = COUNTRIES[:n_countries]
    n_months = max(4, min(12, int(12 * max(scale, 0.4))))
    months = MONTHS[:n_months]

    rows = []
    tid = 0
    base = {c: float(rng.integers(50, 5000)) for c in countries}
    for c in countries:
        for mi, m in enumerate(months):
            growth = 1.0 + 0.5 * np.sin(mi / 3 + base[c] % 3)
            for metric in METRICS:
                tid += 1
                mult = {"new cases": 1.0, "total deaths": 0.04, "recovered patients": 0.6}[metric]
                v = int(base[c] * growth * mult * (1 + rng.random()))
                rows.append(
                    {"tid": tid, "country": c, "month": f"{m} 2020", "metric": metric, "value": v}
                )
    table_pdf = pd.DataFrame(rows)

    def say_metric(metric: str, p_syn: float) -> str:
        words = metric.split()
        if rng.random() < p_syn:
            words = [METRIC_SYNONYM.get(w, w) for w in words]
        return " ".join(words)

    def say_month(month: str, p_abbr: float) -> str:
        name, year = month.split()
        if rng.random() < p_abbr:
            name = MONTH_ABBR[name]
        return f"{name} {year}"

    # Gen sentences are generated from the rows but, as on the real site,
    # they round values and paraphrase metric names — so exact-token lookup
    # is ambiguous and the match needs bucketing / synonym / KB bridges
    gen_rows: List[dict] = []
    n_gen = max(20, int(len(table_pdf) * 0.6 * min(1.0, scale * 2)))
    gen_tids = rng.choice(len(table_pdf), size=n_gen, replace=False)
    templates = [
        "the number of {metric} in {country} in {month} was {value}",
        "in {month} {country} reported {value} {metric}",
        "{country} recorded {value} {metric} during {month}",
    ]
    for i, ti in enumerate(sorted(gen_tids), start=1):
        r = table_pdf.iloc[int(ti)]
        t = pick(rng, templates)
        gen_rows.append(
            {
                "sid": i,
                "text": t.format(
                    metric=say_metric(r.metric, 0.7),
                    country=r.country,
                    month=say_month(r.month, 0.5),
                    value=_say_value(rng, r.value, fuzzy=rng.random() < 0.8),
                ),
                "tid": int(r.tid),
            }
        )
    gen_pdf = pd.DataFrame(gen_rows)

    usr_rows: List[dict] = []
    n_usr = max(10, int(50 * min(1.0, scale * 2)))
    usr_tids = rng.choice(len(table_pdf), size=n_usr, replace=False)
    for i, ti in enumerate(sorted(usr_tids), start=1):
        r = table_pdf.iloc[int(ti)]
        country = pick(rng, TYPOS[r.country]) if rng.random() < 0.5 else r.country
        filler = sample_k(rng, GENERAL_WORDS, int(rng.integers(2, 7)))
        words = (
            ["i", "heard"]
            + filler[:2]
            + [country]
            + ["had", _say_value(rng, r.value, fuzzy=rng.random() < 0.8)]
            + say_metric(r.metric, 0.6).split()
            + say_month(r.month, 0.4).split()
            + filler[2:]
        )
        usr_rows.append({"sid": i, "text": " ".join(words), "tid": int(r.tid)})
    usr_pdf = pd.DataFrame(usr_rows)

    kb_rows = [(c, CONTINENT[c]) for c in countries]
    kb_rows += [(a, b) for a, b in METRIC_SYNONYM.items()]
    kb_rows += [("cases", "virus"), ("deaths", "virus"), ("recovered", "virus")]
    junk = make_words(rng, 40)
    kb_rows += [(junk[j], junk[j + 1]) for j in range(0, len(junk) - 1, 2)]
    kb = pd.DataFrame(kb_rows, columns=["subject", "object"]).drop_duplicates()

    syn_rows = [(t, c) for c in countries for t in TYPOS[c]]
    syn_rows += [(b, a) for a, b in METRIC_SYNONYM.items()]
    syn_rows += [(a, m) for m, a in MONTH_ABBR.items()]
    synonyms = pd.DataFrame(syn_rows, columns=["variant", "canonical"]).drop_duplicates()

    table = TableCorpus(
        "covid", spark.createDataFrame(table_pdf), "tid",
        ["country", "month", "metric", "value"],
    )
    gen = TextCorpus("gen", spark.createDataFrame(gen_pdf[["sid", "text"]]), "sid", "text")
    usr = TextCorpus("usr", spark.createDataFrame(usr_pdf[["sid", "text"]]), "sid", "text")
    truth_gen = spark.createDataFrame(
        gen_pdf[["sid", "tid"]].rename(columns={"sid": "query", "tid": "target"})
    )
    truth_usr = spark.createDataFrame(
        usr_pdf[["sid", "tid"]].rename(columns={"sid": "query", "tid": "target"})
    )
    return CoronaScenario(
        table=table, gen=gen, usr=usr, truth_gen=truth_gen, truth_usr=truth_usr,
        kb=kb, synonyms=synonyms, table_pdf=table_pdf,
    )
