"""Cross-scenario quality smoke at small scale: W-RW vs baselines."""
import os, time, sys

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.datasets import imdb, corona, audit, claims, sts
from repro.kb.synth_kb import prepare_kb, prepare_synonyms
from repro.core.pipeline import TDMatchConfig, run_tdmatch
from repro.core.metrics import ranking_metrics_pdf
from repro.baselines.pretrained import sbe_match, background_model
from repro.baselines.w2vec import w2vec_match
from repro.baselines.d2vec import d2vec_match
from repro.baselines.rank import rank_match

T0 = time.time()


def report(name, ranked_df, truth_df):
    m = ranking_metrics_pdf(ranked_df.toPandas(), truth_df.toPandas(), ks=(1, 5, 20))
    print(f"  {name:10s} MRR={m['MRR']:.3f} MAP@5={m['MAP@5']:.3f} "
          f"HP@1={m['HasPositive@1']:.3f} HP@5={m['HasPositive@5']:.3f} "
          f"[{time.time()-T0:.0f}s]", flush=True)
    return m


bg = background_model(spark, seed=0)
print("background model ready", flush=True)

# ---- IMDb (text to data) ----
sc = imdb.generate(spark, scale=0.12, seed=7)
kb, syn = prepare_kb(spark, sc.kb), prepare_synonyms(spark, sc.synonyms)
print(f"IMDb: {len(sc.movies_pdf)} movies, {len(sc.reviews_pdf)} reviews", flush=True)
for label, table in (("WT", sc.movies_wt), ("NT", sc.movies_nt)):
    print(f" IMDb {label}:")
    cfg = TDMatchConfig(num_walks=10, walk_length=12, window=3, k=20, seed=0)
    report("W-RW", run_tdmatch(spark, sc.reviews, table, config=cfg, synonyms=syn).matches, sc.truth)
    cfg2 = TDMatchConfig(num_walks=10, walk_length=12, window=3, k=20, seed=0, expand=True)
    report("W-RW-EX", run_tdmatch(spark, sc.reviews, table, config=cfg2, kb=kb, synonyms=syn).matches, sc.truth)
    report("S-BE", sbe_match(spark, sc.reviews, table, k=20), sc.truth)
    report("RANK*", rank_match(spark, sc.reviews, table, sc.truth, k=20, bg_vectors=bg, n_folds=3), sc.truth)

# ---- Corona ----
sc = corona.generate(spark, scale=0.4, seed=11)
kb, syn = prepare_kb(spark, sc.kb), prepare_synonyms(spark, sc.synonyms)
print(f"Corona: {len(sc.table_pdf)} tuples", flush=True)
for label, txt, truth in (("Gen", sc.gen, sc.truth_gen), ("Usr", sc.usr, sc.truth_usr)):
    print(f" Corona {label}:")
    cfg = TDMatchConfig(num_walks=10, walk_length=12, window=3, k=20, seed=0, bucket_numeric=True)
    report("W-RW", run_tdmatch(spark, txt, sc.table, config=cfg, synonyms=syn).matches, truth)
    cfg2 = TDMatchConfig(num_walks=10, walk_length=12, window=3, k=20, seed=0, expand=True, bucket_numeric=True)
    report("W-RW-EX", run_tdmatch(spark, txt, sc.table, config=cfg2, kb=kb, synonyms=syn).matches, truth)
    report("S-BE", sbe_match(spark, txt, sc.table, k=20), truth)

# ---- Claims (snopes) ----
sc = claims.generate_snopes(spark, scale=0.12, seed=17)
kb, syn = prepare_kb(spark, sc.kb), prepare_synonyms(spark, sc.synonyms)
print(f"Snopes: {len(sc.claims_pdf)} claims, {len(sc.facts_pdf)} facts", flush=True)
cfg = TDMatchConfig(num_walks=8, walk_length=10, window=15, k=20, seed=0)
report("W-RW", run_tdmatch(spark, sc.claims, sc.facts, config=cfg, synonyms=syn).matches, sc.truth)
cfg2 = TDMatchConfig(num_walks=8, walk_length=10, window=15, k=20, seed=0, expand=True)
report("W-RW-EX", run_tdmatch(spark, sc.claims, sc.facts, config=cfg2, kb=kb, synonyms=syn).matches, sc.truth)
report("S-BE", sbe_match(spark, sc.claims, sc.facts, k=20), sc.truth)
report("RANK*", rank_match(spark, sc.claims, sc.facts, sc.truth, k=20, bg_vectors=bg, n_folds=3), sc.truth)

# ---- STS ----
sc = sts.generate(spark, scale=0.2, seed=23)
syn = prepare_synonyms(spark, sc.synonyms)
print("STS:", len(sc.left_pdf), "pairs", flush=True)
for kthr in (2, 3):
    truth = sc.truth(spark, k=kthr)
    print(f" STS k={kthr}:")
    cfg = TDMatchConfig(num_walks=8, walk_length=10, window=15, k=20, seed=0)
    report("W-RW", run_tdmatch(spark, sc.left, sc.right, config=cfg, synonyms=syn).matches, truth)
    report("S-BE", sbe_match(spark, sc.left, sc.right, k=20), truth)

# ---- Audit ----
from repro.core.metrics import path_metrics, root_to_node_paths
from repro.baselines.matchers import lbe_match
sc = audit.generate(spark, scale=0.25, seed=13)
kb = prepare_kb(spark, sc.kb)
print(f"Audit: {len(sc.taxonomy_pdf)} concepts, {len(sc.docs_pdf)} docs", flush=True)
paths = root_to_node_paths(sc.taxonomy_pdf)
cfg = TDMatchConfig(num_walks=10, walk_length=12, window=15, k=10, seed=0)
res = run_tdmatch(spark, sc.docs, sc.taxonomy, config=cfg)
pm = path_metrics(res.matches.toPandas(), sc.truth.toPandas(), paths, k=1, mode="node")
print("  W-RW   node@1:", {a: round(b, 3) for a, b in pm.items()}, flush=True)
pm = path_metrics(res.matches.toPandas(), sc.truth.toPandas(), paths, k=1, mode="exact")
print("  W-RW   exact@1:", {a: round(b, 3) for a, b in pm.items()}, flush=True)
lbe = lbe_match(spark, sc.docs, sc.taxonomy, sc.truth, k=10, n_folds=3)
pm = path_metrics(lbe.toPandas(), sc.truth.toPandas(), paths, k=1, mode="node")
print("  L-BE*  node@1:", {a: round(b, 3) for a, b in pm.items()}, flush=True)
report("S-BE", sbe_match(spark, sc.docs, sc.taxonomy, k=10), sc.truth)

print(f"TOTAL {time.time()-T0:.0f}s")
spark.stop()
