"""IMDb shape check: W-RW / W-RW-EX / S-BE / RANK* on WT and NT."""
import os, time

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("s")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.ui.showConsoleProgress", "false")
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.datasets import imdb
from repro.kb.synth_kb import prepare_kb, prepare_synonyms
from repro.core.pipeline import TDMatchConfig, run_tdmatch
from repro.core.metrics import ranking_metrics_pdf
from repro.baselines.rank import rank_match
from repro.baselines.pretrained import background_model, sbe_match

t0 = time.time()
sc = imdb.generate(spark, scale=0.12, seed=7)
kb, syn = prepare_kb(spark, sc.kb), prepare_synonyms(spark, sc.synonyms)
bg = background_model(spark, seed=0)
tp = sc.truth.toPandas()


def rep(label, name, df):
    m = ranking_metrics_pdf(df.toPandas(), tp, ks=(1, 5, 20))
    print(label, name, {k: round(v, 3) for k, v in m.items()}, f"{time.time()-t0:.0f}s", flush=True)


for label, table in (("WT", sc.movies_wt), ("NT", sc.movies_nt)):
    for name, expand in (("W-RW", False), ("W-RW-EX", True)):
        cfg = TDMatchConfig(num_walks=25, walk_length=14, window=3, k=20, seed=0, expand=expand)
        res = run_tdmatch(spark, sc.reviews, table, config=cfg, kb=kb if expand else None, synonyms=syn)
        rep(label, name, res.matches)
    rep(label, "S-BE", sbe_match(spark, sc.reviews, table, k=20))
    rep(label, "RANK*", rank_match(spark, sc.reviews, table, sc.truth, k=20, bg_vectors=bg, n_folds=3))
spark.stop()
