"""Benchmark + regeneration of the §V-C error-vs-n curves (Figs. 3-5 as
data): expression error falls, model error rises, the bound and the
measured real error are U-shaped and move together. Saves CSVs consumed by
EXPERIMENTS.md."""
from pathlib import Path

import pytest

from repro.experiments.config import BENCH
from repro.experiments.error_curves import error_curves

RESULTS = Path(__file__).resolve().parent.parent / "results"
SWEEP = [1, 2, 3, 4, 6, 8, 10, 12, 14, 16, 19]


@pytest.mark.parametrize(
    "city,model",
    [("nyc", "deepst"), ("nyc", "mlp"), ("nyc", "dmvst"),
     ("chengdu", "deepst"), ("xian", "deepst")],
)
def test_error_curves(benchmark, spark, city, model, request):
    data = request.getfixturevalue(f"bench_{city}")

    def run():
        return error_curves(spark, data, model_name=model, n_sides=SWEEP)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    RESULTS.mkdir(exist_ok=True)
    df.to_csv(RESULTS / f"curves_{city}_{model}.csv", index=False)
    print(f"\n=== error curves ({city}, {model}) ===")
    print(df.to_string(index=False))
    # §V-C shape assertions at bench scale
    assert df["expr_error"].iloc[-1] < df["expr_error"].iloc[0]
    assert df["model_error"].iloc[-1] > df["model_error"].iloc[0]
    assert (df["real_error"] <= df["bound"] * 1.10).all()
