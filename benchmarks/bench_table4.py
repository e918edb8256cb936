"""Benchmark + regeneration of Table IV at BENCH scale.

Every 4th time slot (12 OGSS instances per city) keeps the benchmark
under control; ``jobs/run_table4.py`` sweeps all 48 as the paper does.
"""
from pathlib import Path

import pytest

from repro.experiments.config import BENCH
from repro.experiments.table4 import run_table4

SLOTS = list(range(0, BENCH.slots, 4))
RESULTS = Path(__file__).resolve().parent.parent / "results"


@pytest.mark.parametrize("city", ["nyc", "chengdu", "xian"])
def test_table4_city(benchmark, spark, city, request):
    data = request.getfixturevalue(f"bench_{city}")

    def run():
        return run_table4(spark, data, slots=SLOTS)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    RESULTS.mkdir(exist_ok=True)
    df.to_csv(RESULTS / f"table4_{city}.csv", index=False)
    print(f"\n=== Table IV ({city} twin, {len(SLOTS)} slots) ===")
    print(df.to_string(index=False))
    by = df.set_index("algorithm")
    assert by.loc["Brute-force Search", "probability"] == 1.0
    assert (
        by.loc["Ternary Search", "bound_calls"]
        < by.loc["Brute-force Search", "bound_calls"]
    )
    assert (
        by.loc["Iterative Method", "bound_calls"]
        < by.loc["Brute-force Search", "bound_calls"]
    )
