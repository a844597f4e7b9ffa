"""Benchmark: regenerate Table I (IMDb, text to data) and time the run.

One round, one iteration: each table run is minutes of Spark work, so the
benchmark measures a single end-to-end regeneration, and the sanity asserts
double as a quality gate on the table's headline shape.
"""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.15"))


def test_table1_imdb(benchmark, spark):
    from jobs.table1_imdb import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    wt = pdf[pdf["Variant"] == "WT"].set_index("Method")
    # headline shape: our unsupervised method beats the pre-trained baseline
    assert wt.loc["W-RW", "MRR"] > wt.loc["S-BE", "MRR"]
