"""Quality smoke: W-RW and W-RW-EX on small synthetic IMDb."""
import os, time

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.ui.showConsoleProgress", "false")
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.datasets import imdb
from repro.kb.synth_kb import prepare_kb, prepare_synonyms
from repro.core.pipeline import TDMatchConfig, run_tdmatch
from repro.core.metrics import ranking_metrics

t0 = time.time()
sc = imdb.generate(spark, scale=0.25, seed=7)
print("movies:", sc.movies_pdf.shape, "reviews:", sc.reviews_pdf.shape)

kb = prepare_kb(spark, sc.kb)
syn = prepare_synonyms(spark, sc.synonyms)

for variant, expand in (("W-RW", False), ("W-RW-EX", True)):
    cfg = TDMatchConfig(num_walks=10, walk_length=12, vector_size=64, window=3,
                        expand=expand, k=20, seed=0)
    res = run_tdmatch(spark, sc.reviews, sc.movies_wt, config=cfg,
                      kb=kb if expand else None, synonyms=syn)
    m = ranking_metrics(res.matches, sc.truth, ks=(1, 5, 20))
    print(variant, "WT", {k: round(v, 3) for k, v in m.items()}, "sizes:", res.graph_sizes,
          f"({time.time()-t0:.0f}s)")
spark.stop()
