"""Benchmark: regenerate Table II (CoronaCheck, text to data)."""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.3"))


def test_table2_corona(benchmark, spark):
    from jobs.table2_corona import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    gen = pdf[pdf["Variant"] == "Gen"].set_index("Method")
    assert gen.loc["W-RW", "MRR"] > gen.loc["S-BE", "MRR"]
