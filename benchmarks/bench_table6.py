"""Benchmark: regenerate Table VI (STS at thresholds k=2, k=3)."""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.3"))


def test_table6_sts(benchmark, spark):
    from jobs.table6_sts import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    k3 = pdf[pdf["k"] == 3].set_index("Method")
    k2 = pdf[pdf["k"] == 2].set_index("Method")
    # higher threshold = more overlap among positives = easier (paper shape)
    assert k3.loc["W-RW", "MRR"] >= k2.loc["W-RW", "MRR"] - 0.05
