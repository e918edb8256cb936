"""Benchmark: one Algorithm-3 UpperBound evaluation as a Spark job —
the unit of cost every §IV search algorithm pays per candidate n."""
import pytest

from repro.core.upper_bound import UpperBoundEvaluator
from repro.experiments.config import BENCH
from repro.models import MODELS


@pytest.fixture(scope="module")
def evaluator(spark, bench_nyc):
    return UpperBoundEvaluator(
        spark, bench_nyc.events, bench_nyc.cfg, BENCH.N_side, MODELS["deepst"],
        days=BENCH.days, slots=BENCH.slots,
        train_days=BENCH.train_days, val_days=BENCH.val_days, K=BENCH.K,
    )


@pytest.mark.parametrize("n_side", [2, 4, 8, 16])
def test_upper_bound_evaluation(benchmark, evaluator, n_side):
    slot = iter(range(BENCH.slots))

    def run():
        # a fresh slot each round so memoisation never short-circuits
        return evaluator.evaluate(n_side, next(slot)).bound

    out = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    assert out > 0
