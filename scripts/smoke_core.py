"""Manual smoke test of the core pipeline on a toy Example-1-like input."""
import os, sys

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[4] --driver-memory 4g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
import pandas as pd
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("smoke")
    .config("spark.sql.shuffle.partitions", "8")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.core.graph import TableCorpus, TextCorpus, build_graph
from repro.core.pipeline import TDMatchConfig, run_tdmatch

movies = spark.createDataFrame(
    pd.DataFrame(
        {
            "mid": [1, 2],
            "title": ["The Sixth Sense", "Pulp Fiction"],
            "director": ["Shyamalan", "Tarantino"],
            "actor": ["B. Willis", "B. Willis"],
            "rate": ["PG", "R"],
            "genre": ["Thriller", "Drama"],
        }
    )
)
reviews = spark.createDataFrame(
    pd.DataFrame(
        {
            "rid": [1, 2],
            "text": [
                "I think that the first part of Bruce Willis story is just bland, "
                "not to mention the comedy in this film by Tarantino",
                "In a key scene Willis asks Osment what he wants most, received only "
                "a PG rating, a thriller by Shyamalan indeed the sixth sense",
            ],
        }
    )
)
table = TableCorpus("movies", movies, "mid", ["title", "director", "actor", "rate", "genre"])
text = TextCorpus("reviews", reviews, "rid", "text")

g = build_graph(spark, text, table)
print("nodes:", g.num_nodes(), "edges:", g.num_edges())
g.nodes.orderBy("id").show(60, False)

kb = spark.createDataFrame(
    pd.DataFrame({"subject": ["tarantino", "willi"], "object": ["comedy", "bruce_willi"]})
)
res = run_tdmatch(
    spark,
    text,
    table,
    config=TDMatchConfig(num_walks=20, walk_length=8, vector_size=32, expand=True, k=2),
    kb=kb,
)
print("graph sizes:", res.graph_sizes)
res.matches.orderBy("query", "rank").show(20, False)
spark.stop()
