"""Benchmark: regenerate Table IV (Politifact, text to text)."""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.2"))


def test_table4_politifact(benchmark, spark):
    from jobs.table4_politifact import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    t = pdf.set_index("Method")
    assert t.loc["W-RW", "MRR"] > t.loc["S-BE", "MRR"]
