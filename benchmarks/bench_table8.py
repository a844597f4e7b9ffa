"""Benchmark: regenerate Table VIII (compression sizes + MRR)."""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.12"))


def test_table8_compression(benchmark, spark):
    from jobs.table8_compression import run

    pdf = benchmark.pedantic(run, kwargs=dict(spark=spark, scale=SCALE), rounds=1, iterations=1)
    print(pdf.to_string(index=False))
    for _, row in pdf.iterrows():
        # expansion grows the graph; MSP compresses the expanded graph
        assert row["Expanded #E"] >= row["Original #E"]
        assert row["MSP(0.25) #E"] <= row["Expanded #E"]
