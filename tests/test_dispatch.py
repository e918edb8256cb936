"""Tests for the task-assignment substrate (POLAR / LS, §V-D)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.grids import grid_spec
from repro.dispatch.ls import ls_weights, mean_fare_by_cell
from repro.dispatch.polar import polar_weights
from repro.dispatch.simulator import (
    _allocate,
    day_orders,
    simulate_day,
    spread_to_cells,
)
from repro.experiments.config import TESTS
from repro.oracle import assert_equivalent


class TestAllocate:
    def test_sums_to_total(self):
        w = np.array([0.5, 0.3, 0.2, 0.0])
        for total in (0, 1, 7, 100):
            assert _allocate(w, total).sum() == total

    def test_proportional(self):
        out = _allocate(np.array([3.0, 1.0]), 100)
        assert out[0] == 75 and out[1] == 25

    def test_largest_remainder(self):
        out = _allocate(np.array([1.0, 1.0, 1.0]), 4)
        assert sorted(out.tolist()) == [1, 1, 2]

    def test_negative_weights_clipped(self):
        out = _allocate(np.array([-5.0, 1.0]), 10)
        assert out[0] == 0 and out[1] == 10

    def test_all_zero_weights(self):
        out = _allocate(np.zeros(4), 3)
        assert out.sum() == 3 and (out >= 0).all()


class TestSpreadToCells:
    def test_mass_conserved(self):
        spec = grid_spec(__import__("repro.synth_data", fromlist=["NYC"]).NYC, 4, 16)
        pred = np.arange(spec.n, dtype=float)
        cells = spread_to_cells(pred, spec, 16)
        assert cells.sum() == pytest.approx(pred.sum())

    def test_uniform_within_mgrid(self):
        from repro.synth_data import NYC

        spec = grid_spec(NYC, 2, 16)
        pred = np.array([4.0, 8.0, 12.0, 16.0])
        cells = spread_to_cells(pred, spec, 8).reshape(8, 8)
        # one MGrid covers a 4x4 block of the 8-lattice
        assert np.unique(cells[:4, :4]).size == 1
        assert cells[:4, :4].sum() == pytest.approx(4.0)
        assert cells[4:, 4:].sum() == pytest.approx(16.0)

    def test_rejects_wrong_length(self):
        from repro.synth_data import NYC

        with pytest.raises(ValueError):
            spread_to_cells(np.ones(5), grid_spec(NYC, 2, 16), 8)


class TestDayOrders:
    @pytest.fixture(scope="class")
    def orders(self, nyc):
        return day_orders(nyc.events, nyc.cfg, day=TESTS.test_day, P=16)

    def test_row_count(self, nyc, orders):
        assert len(orders) == nyc.events.where(F.col("day") == TESTS.test_day).count()

    def test_cells_in_range(self, orders):
        assert orders["cell"].between(0, 255).all()
        assert orders["dest_cell"].between(0, 255).all()

    def test_trip_km_consistent(self, orders):
        d = np.hypot(
            orders["dest_x"] - orders["x"], orders["dest_y"] - orders["y"]
        )
        np.testing.assert_allclose(orders["trip_km"], d, rtol=1e-9)

    def test_cell_counts_match_duckdb(self, nyc, nyc_pdf, spark, orders):
        got = spark.createDataFrame(
            orders.groupby(["slot", "cell"]).size().reset_index(name="cnt")
        )
        w, h = nyc.cfg.width_km, nyc.cfg.height_km
        assert_equivalent(
            got,
            f"""
            SELECT slot,
                   least(CAST(floor(y / {h / 16}) AS INT), 15) * 16
                   + least(CAST(floor(x / {w / 16}) AS INT), 15) AS cell,
                   count(*) AS cnt
            FROM events WHERE day = {TESTS.test_day} GROUP BY slot, 2
            """,
            events=nyc_pdf,
        )


def _tiny_orders():
    return pd.DataFrame(
        {
            "slot": [0, 0, 0, 1, 1],
            "cell": [0, 0, 3, 1, 1],
            "dest_cell": [1, 2, 0, 3, 3],
            "trip_km": [1.0, 2.0, 30.0, 1.0, 1.0],
            "revenue": [10.0, 5.0, 20.0, 7.0, 3.0],
        }
    )


class TestSimulateDay:
    def test_perfect_weights_serve_everything(self):
        orders = _tiny_orders()
        w = np.zeros((2, 4))
        w[0, 0], w[0, 3] = 2, 1
        w[1, 1] = 2
        m = simulate_day(orders, w, P=2, n_drivers=5, slots=2)
        assert m.served == 5 and m.arrived == 5
        assert m.revenue == pytest.approx(45.0)

    def test_wrong_cell_serves_nothing(self):
        orders = _tiny_orders()
        w = np.zeros((2, 4))
        w[:, 2] = 1.0  # all drivers sent to a cell with no demand
        m = simulate_day(orders, w, P=2, n_drivers=5, slots=2)
        assert m.served == 0 and m.revenue == 0.0

    def test_capacity_binds_highest_revenue_first(self):
        orders = _tiny_orders()
        w = np.zeros((2, 4))
        w[0, 0] = 1.0
        m = simulate_day(orders, w, P=2, n_drivers=1, slots=2)
        # one driver in cell 0 at slot 0: serves the 10.0 order, then is busy
        assert m.served == 1 and m.revenue == 10.0

    def test_busy_time_blocks_reuse(self):
        orders = pd.DataFrame(
            {
                "slot": [0, 1],
                "cell": [0, 0],
                "dest_cell": [0, 0],
                "trip_km": [100.0, 1.0],  # first trip takes many slots
                "revenue": [1.0, 1.0],
            }
        )
        w = np.zeros((2, 1))
        w[:, 0] = 1.0
        m = simulate_day(orders, w, P=1, n_drivers=1, slots=2)
        assert m.served == 1

    def test_served_never_exceeds_arrived(self, nyc):
        orders = day_orders(nyc.events, nyc.cfg, day=TESTS.test_day, P=16)
        w = np.ones((TESTS.slots, 256))
        m = simulate_day(orders, w, P=16, n_drivers=100, slots=TESTS.slots)
        assert 0 < m.served <= m.arrived == len(orders)

    def test_deterministic(self, nyc):
        orders = day_orders(nyc.events, nyc.cfg, day=TESTS.test_day, P=16)
        w = np.ones((TESTS.slots, 256))
        m1 = simulate_day(orders, w, P=16, n_drivers=80, slots=TESTS.slots)
        m2 = simulate_day(orders, w, P=16, n_drivers=80, slots=TESTS.slots)
        assert m1 == m2

    def test_more_drivers_serve_no_fewer(self, nyc):
        orders = day_orders(nyc.events, nyc.cfg, day=TESTS.test_day, P=16)
        w = np.ones((TESTS.slots, 256))
        lo = simulate_day(orders, w, P=16, n_drivers=40, slots=TESTS.slots)
        hi = simulate_day(orders, w, P=16, n_drivers=400, slots=TESTS.slots)
        assert hi.served >= lo.served


class TestPolicies:
    def test_polar_weights_shape(self, nyc):
        spec = grid_spec(nyc.cfg, 4, 16)
        preds = np.ones((TESTS.slots, spec.n))
        w = polar_weights(preds, spec, 16)
        assert w.shape == (TESTS.slots, 256)

    def test_ls_weights_prefer_higher_fares(self, nyc):
        spec = grid_spec(nyc.cfg, 4, 16)
        preds = np.ones((1, spec.n))
        fares = np.ones(256)
        fares[7] = 50.0
        w = ls_weights(preds, spec, 16, fares)
        assert w[0, 7] == w[0].max()

    def test_mean_fare_positive_everywhere(self, nyc):
        fares = mean_fare_by_cell(
            nyc.events, nyc.cfg, P=16, train_days=TESTS.train_days
        )
        assert fares.shape == (256,)
        assert (fares > 0).all()  # shrinkage keeps cold cells at city mean
