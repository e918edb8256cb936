"""Integration trend tests — the paper's §V-C claims at unit-test scale.

These reproduce (as assertions) what Figures 3-5 show: expression error
falls with n, model error rises with n, the bound dominates the measured
real error and both share the trend. Endpoint/aggregate comparisons are
used instead of strict monotonicity because the ceil-induced fine-lattice
sawtooth (present in the paper's formulation too) makes pointwise
monotonicity false by construction.
"""
import numpy as np
import pytest

from repro.experiments.config import TESTS
from repro.experiments.error_curves import error_curves

SWEEP = [1, 2, 3, 4, 6, 8, 10]


@pytest.fixture(scope="module")
def nyc_curves(spark, nyc):
    return error_curves(spark, nyc, model_name="deepst", n_sides=SWEEP)


@pytest.fixture(scope="module")
def xian_curves(spark, xian):
    return error_curves(spark, xian, model_name="deepst", n_sides=SWEEP)


class TestExpressionErrorTrend:
    def test_decreases_from_coarse_to_fine(self, nyc_curves):
        ee = nyc_curves["expr_error"]
        assert ee.iloc[-1] < ee.iloc[0]

    def test_first_half_above_second_half(self, nyc_curves):
        ee = nyc_curves["expr_error"].to_numpy()
        assert ee[:3].mean() > ee[-3:].mean()

    def test_nyc_larger_than_xian(self, nyc_curves, xian_curves):
        """§V-C: the more uneven and busier city has larger E_e at equal n."""
        assert (
            nyc_curves["expr_error"].to_numpy()
            > xian_curves["expr_error"].to_numpy()
        ).all()


class TestModelErrorTrend:
    def test_increases_from_coarse_to_fine(self, nyc_curves):
        me = nyc_curves["model_error"]
        assert me.iloc[-1] > me.iloc[0]

    def test_first_half_below_second_half(self, nyc_curves):
        me = nyc_curves["model_error"].to_numpy()
        assert me[:3].mean() < me[-3:].mean()


class TestBoundVsRealError:
    def test_bound_dominates_everywhere(self, nyc_curves):
        """Theorem II.1 at every swept n (10% sampling slack, 4 val days)."""
        assert (
            nyc_curves["real_error"] <= nyc_curves["bound"] * 1.10
        ).all()

    def test_same_trend(self, nyc_curves):
        """Bound and real error move together across the sweep."""
        b = nyc_curves["bound"].to_numpy()
        r = nyc_curves["real_error"].to_numpy()
        corr = np.corrcoef(b, r)[0, 1]
        assert corr > 0.6

    def test_bound_gap_within_theorem_II_1_slack(self, nyc_curves):
        """E_u - E_r <= 2*min(E_e, E_m) (generous slack: E_e is analytic
        over estimated alphas while E_r/E_m are measured on 4 days)."""
        gap = nyc_curves["bound"] - nyc_curves["real_error"]
        cap = 2 * np.minimum(
            nyc_curves["expr_error"], nyc_curves["model_error"]
        )
        assert (gap <= cap * 1.5 + 3.0).all()


class TestOptimalN:
    def test_xian_optimum_not_larger_than_nyc(self, nyc_curves, xian_curves):
        """§V-C: the small, even city tunes to a smaller (or equal) n."""
        nyc_opt = nyc_curves.loc[nyc_curves["bound"].idxmin(), "n_side"]
        xian_opt = xian_curves.loc[xian_curves["bound"].idxmin(), "n_side"]
        assert xian_opt <= nyc_opt

    def test_nyc_bound_is_u_shaped(self, nyc_curves):
        """The minimiser is interior or at least not the finest grid, and
        both coarse and fine extremes are worse than the optimum."""
        b = nyc_curves["bound"].to_numpy()
        k = int(b.argmin())
        assert b[k] < b[0] or b[k] < b[-1]
        assert b[k] <= b.min()


class TestBetterModelLargerOptimum:
    @pytest.mark.slow
    def test_dmvst_optimum_geq_mlp(self, spark, nyc):
        """§V-C: higher-accuracy models shift the optimal n upward."""
        sweep = [1, 2, 4, 6, 8]
        weak = error_curves(spark, nyc, model_name="mlp", n_sides=sweep)
        strong = error_curves(spark, nyc, model_name="dmvst", n_sides=sweep)
        s_weak = weak.loc[weak["bound"].idxmin(), "n_side"]
        s_strong = strong.loc[strong["bound"].idxmin(), "n_side"]
        assert s_strong >= s_weak
