"""Benchmark: regenerate Table VII (train/test execution times)."""
import math
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.2"))


def test_table7_times(benchmark, spark):
    from jobs.table7_times import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    t2d = pdf[pdf["Task"] == "Text to data"].set_index("Method")
    # headline: our method's per-match (test) time beats the classifiers'
    assert t2d.loc["W-RW", "Test"] <= t2d.loc["RANK*", "Test"] * 2
