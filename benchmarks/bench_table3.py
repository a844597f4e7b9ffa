"""Benchmark: regenerate Table III (Audit, text to structured text)."""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.3"))


def test_table3_audit(benchmark, spark):
    from jobs.table3_audit import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    k1 = pdf[pdf["K"] == 1].set_index("Method")
    assert k1.loc["W-RW", "Node F"] > k1.loc["S-BE", "Node F"]
