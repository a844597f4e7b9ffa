"""NT-only variance check across seeds."""
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

for seed in (7, 8):
    sc = imdb.generate(spark, scale=0.15, seed=seed)
    kb, syn = prepare_kb(spark, sc.kb), prepare_synonyms(spark, sc.synonyms)
    tp = sc.truth.toPandas()
    for name, expand in (("W-RW", False), ("W-RW-EX", True)):
        cfg = TDMatchConfig(num_walks=25, walk_length=14, window=3, k=20, seed=0, expand=expand)
        res = run_tdmatch(spark, sc.reviews, sc.movies_nt, config=cfg,
                          kb=kb if expand else None, synonyms=syn)
        m = ranking_metrics_pdf(res.matches.toPandas(), tp, ks=(1, 5))
        print(f"seed={seed} NT {name} MRR={m['MRR']:.3f} MAP@5={m['MAP@5']:.3f}", flush=True)
spark.stop()
