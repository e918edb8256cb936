"""Benchmark + regeneration of Table III at BENCH scale (NYC twin).

Prints the paper-vs-measured rows consumed by EXPERIMENTS.md; the
pytest-benchmark timing wraps the whole tune-and-replay pipeline once.
"""
from pathlib import Path

from repro.experiments.table3 import run_table3

RESULTS = Path(__file__).resolve().parent.parent / "results"


def test_table3_nyc(benchmark, spark, bench_nyc):
    def run():
        return run_table3(spark, bench_nyc)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    RESULTS.mkdir(exist_ok=True)
    df.to_csv(RESULTS / "table3_nyc.csv", index=False)
    print("\n=== Table III (NYC twin, BENCH scale) ===")
    print(df.to_string(index=False))
    assert len(df) == 6
    polar = df[df["algorithm"] == "POLAR"]
    assert (polar["improve_ratio"] > 0).all(), "POLAR must gain from tuning"
