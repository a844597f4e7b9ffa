"""Stage-by-stage timing of the pipeline on small IMDb."""
import os, sys, time

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

def t(msg, t0=[time.time()]):
    now = time.time()
    print(f"[{now - t0[0]:7.1f}s] {msg}", flush=True)
    t0[0] = now

from repro.datasets import imdb
from repro.kb.synth_kb import prepare_kb, prepare_synonyms
from repro.core.graph import build_graph
from repro.core.merge import merge_synonyms
from repro.core.walks import generate_walks
from repro.core.embed import train_embeddings
from repro.core.match import top_k_matches
from repro.core.metrics import ranking_metrics
from pyspark.sql import functions as F

sc = imdb.generate(spark, scale=0.1, seed=7)
t(f"generate: movies={len(sc.movies_pdf)} reviews={len(sc.reviews_pdf)}")
syn = prepare_synonyms(spark, sc.synonyms)
g = build_graph(spark, sc.reviews, sc.movies_wt)
t(f"build_graph: N={g.num_nodes()} E={g.num_edges()}")
g, nm = merge_synonyms(g, syn)
t(f"merge_synonyms: N={g.num_nodes()} E={g.num_edges()} merged={nm}")
adj = g.adjacency()
t(f"adjacency: {len(adj)} nodes")
walks = generate_walks(g, num_walks=10, walk_length=12, seed=0)
n = walks.count()
t(f"walks: {n}")
emb = train_embeddings(walks, vector_size=64, window=3, seed=0).cache()
t(f"embeddings: {emb.count()}")
q = emb.join(g.doc_nodes("reviews").select(F.col("id").alias("node")), "node")
tg = emb.join(g.doc_nodes("movies").select(F.col("id").alias("node")), "node")
ranked = top_k_matches(q, tg, k=20)
from repro.core.pipeline import strip_prefix
matches = ranked.select(strip_prefix("query", "reviews").alias("query"),
                        strip_prefix("target", "movies").alias("target"), "score", "rank")
matches = matches.cache(); matches.count()
t("matching done")
m = ranking_metrics(matches, sc.truth, ks=(1, 5, 20))
t(f"metrics: { {k: round(v,3) for k,v in m.items()} }")
spark.stop()
