"""Tests for the OGSS search algorithms (paper §IV, Algorithms 4-5)."""
import pytest

from repro.core.search import brute_force, iterative_method, ternary_search


class Counter:
    """Wraps a profile dict/function and counts distinct evaluations."""

    def __init__(self, fn):
        self.fn = fn if callable(fn) else (lambda s, d=fn: d[s])
        self.calls = 0

    def __call__(self, s):
        self.calls += 1
        return self.fn(s)


UNIMODAL = lambda s: (s - 11) ** 2 + 3.0  # minimum at 11
MONOTONE_UP = lambda s: 2.0 * s
MONOTONE_DOWN = lambda s: -2.0 * s


@pytest.mark.parametrize(
    "algo",
    [
        brute_force,
        ternary_search,
        lambda f, lo, hi: iterative_method(f, lo, hi, p=16, b=4),
    ],
    ids=["brute", "ternary", "iterative"],
)
class TestAllAlgorithmsOnEasyProfiles:
    def test_unimodal(self, algo):
        assert algo(UNIMODAL, 1, 30).s_opt == 11

    def test_monotone_increasing(self, algo):
        assert algo(MONOTONE_UP, 2, 25).s_opt == 2

    def test_monotone_decreasing(self, algo):
        assert algo(MONOTONE_DOWN, 2, 25).s_opt == 25

    def test_single_point_range(self, algo):
        assert algo(UNIMODAL, 7, 7).s_opt == 7

    def test_two_point_range(self, algo):
        assert algo(UNIMODAL, 10, 11).s_opt == 11

    def test_n_opt_is_square(self, algo):
        res = algo(UNIMODAL, 1, 30)
        assert res.n_opt == res.s_opt**2

    def test_each_point_evaluated_once(self, algo):
        c = Counter(UNIMODAL)
        res = algo(c, 1, 30)
        assert c.calls == res.calls == len(res.evaluated)


class TestBruteForce:
    def test_evaluates_everything(self):
        res = brute_force(UNIMODAL, 3, 20)
        assert set(res.evaluated) == set(range(3, 21))

    def test_global_on_multimodal(self):
        prof = {s: [9, 5, 8, 2, 9, 1, 7][s - 1] for s in range(1, 8)}
        assert brute_force(Counter(prof), 1, 7).s_opt == 6


class TestTernary:
    def test_logarithmic_call_count(self):
        c = Counter(lambda s: (s - 40) ** 2)
        res = ternary_search(c, 1, 100)
        assert res.s_opt == 40
        assert c.calls < 30  # << 100 brute-force evaluations

    def test_fewer_calls_than_brute(self):
        c1, c2 = Counter(UNIMODAL), Counter(UNIMODAL)
        ternary_search(c1, 1, 60)
        brute_force(c2, 1, 60)
        assert c1.calls < c2.calls

    def test_can_miss_global_on_multimodal(self):
        """§IV-C: ternary may miss the global optimum on non-unimodal
        profiles — it still returns *some* evaluated local candidate."""
        prof = {s: 100 - s for s in range(1, 31)}
        prof[3] = 0.5  # sharp dip far from the monotone trend's minimum
        res = ternary_search(Counter(prof), 1, 30)
        assert res.s_opt in res.evaluated

    def test_terminates_on_flat_profile(self):
        res = ternary_search(lambda s: 1.0, 1, 50)
        assert 1 <= res.s_opt <= 50


class TestIterative:
    def test_prior_clamped_into_range(self):
        assert iterative_method(UNIMODAL, 2, 9, p=16, b=4).s_opt == 9

    def test_finds_optimum_within_boundary_hops(self):
        assert iterative_method(UNIMODAL, 1, 30, p=13, b=4).s_opt == 11

    def test_stops_at_local_minimum_beyond_boundary(self):
        """A global optimum further than b from any descent path is missed
        — the paper's stated trade-off for small b."""
        prof = {s: abs(s - 16) for s in range(1, 31)}
        prof[2] = -5  # global optimum far from the prior
        res = iterative_method(Counter(prof), 1, 30, p=16, b=3)
        assert res.s_opt == 16

    def test_larger_boundary_escapes(self):
        prof = {s: abs(s - 16) for s in range(1, 31)}
        prof[2] = -5.0
        for s in range(3, 13):
            prof[s] = prof[s] + 0.0
        res = iterative_method(Counter(prof), 1, 30, p=16, b=14)
        assert res.s_opt == 2

    def test_probes_boundary_first_on_monotone(self):
        """From-the-boundary probing descends monotone stretches in big
        steps: the walk 16 -> 11 costs far fewer evals than unit stepping."""
        c = Counter(MONOTONE_DOWN)
        res = iterative_method(c, 1, 61, p=16, b=4)
        assert res.s_opt == 61
        assert c.calls <= 30

    def test_beats_ternary_hit_rate_on_jagged_profiles(self):
        """§V-E headline: Iterative (good prior) hits the optimum more often
        than Ternary on jagged, near-prior-optimal profiles."""
        import numpy as np

        rng = np.random.default_rng(0)
        t_hits = i_hits = 0
        for _ in range(40):
            opt = int(rng.integers(12, 21))
            prof = {
                s: (s - opt) ** 2 / 8 + rng.random() * 6 for s in range(1, 31)
            }
            prof[opt] = -1.0
            truth = brute_force(lambda s: prof[s], 1, 30).s_opt
            t_hits += ternary_search(lambda s: prof[s], 1, 30).s_opt == truth
            i_hits += (
                iterative_method(lambda s: prof[s], 1, 30, p=16, b=4).s_opt == truth
            )
        assert i_hits > t_hits
