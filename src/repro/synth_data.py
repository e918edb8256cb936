"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


# ---------------------------------------------------------------------------
# GridTuner substrate: synthetic taxi-trip twins of NYC / Chengdu / Xi'an.
#
# The paper evaluates on NYC TLC 2013 yellow-taxi trips and DiDi GAIA
# Chengdu/Xi'an trips, none of which are available offline. Each city is
# replaced by a synthetic twin (documented in DESIGN.md §3): a fixed spatial
# intensity field (Gaussian hotspots + a "main road" ridge + uniform floor)
# modulated by a 48-slot temporal profile; per-(day, slot, cell) counts are
# Poisson — the paper's own verified distributional assumption for HGrids.
# Parameters are tuned so the orderings the paper reports hold:
# unevenness(NYC) > unevenness(Chengdu) > unevenness(Xi'an), and the daily
# order counts / city areas match §V-A at scale factor 1.
# ---------------------------------------------------------------------------
from dataclasses import dataclass


@dataclass(frozen=True)
class CityConfig:
    """Static description of one synthetic city.

    ``hotspots`` are ``(cx, cy, sigma, weight)`` in unit coordinates;
    ``road`` is ``(x0, y0, x1, y1, sigma, weight)`` — a ridge of intensity
    along a segment; ``floor`` is the uniform background weight. Each
    weight is the *fraction of total event mass* carried by that component
    (components are individually normalised before mixing), so a city with
    ``floor=0.1`` really does concentrate 90% of its demand in the
    hotspots/road — which is what makes NYC's twin strongly uneven.
    """

    name: str
    daily_orders: int  # orders per day at SF=1 (paper §V-A test-day counts)
    width_km: float
    height_km: float
    hotspots: tuple = ()
    road: tuple | None = None
    floor: float = 0.2  # fraction of total mass spread uniformly
    weekend_factor: float = 0.75
    seed: int = 7


# Paper §V-A: NYC 282,255 test-day orders over 23km x 37km, very uneven
# (Manhattan band); Chengdu 238,868 over 23km x 37km, more even; Xi'an
# 109,753 over 8.5km x 8.6km, most even.
NYC = CityConfig(
    name="nyc",
    daily_orders=282_255,
    width_km=23.0,
    height_km=37.0,
    hotspots=(
        (0.42, 0.55, 0.035, 0.22),
        (0.46, 0.70, 0.045, 0.18),
        (0.38, 0.35, 0.05, 0.12),
        (0.60, 0.80, 0.06, 0.06),
    ),
    road=(0.34, 0.12, 0.52, 0.92, 0.018, 0.36),
    floor=0.06,
    seed=11,
)
CHENGDU = CityConfig(
    name="chengdu",
    daily_orders=238_868,
    width_km=23.0,
    height_km=37.0,
    hotspots=(
        (0.50, 0.50, 0.16, 0.38),
        (0.35, 0.62, 0.10, 0.10),
        (0.62, 0.40, 0.10, 0.10),
    ),
    road=(0.20, 0.50, 0.80, 0.50, 0.05, 0.12),
    floor=0.30,
    seed=13,
)
XIAN = CityConfig(
    name="xian",
    daily_orders=109_753,
    width_km=8.5,
    height_km=8.6,
    hotspots=((0.50, 0.50, 0.30, 0.30),),
    road=None,
    floor=0.70,
    seed=17,
)
CITIES = {"nyc": NYC, "chengdu": CHENGDU, "xian": XIAN}

#: resolution of the generator's intensity lattice (per side). All event
#: positions are continuous; this only controls how finely the Poisson
#: means vary across space. 128 matches the paper's finest HGrid lattice.
GEN_SIDE = 128
SLOTS_PER_DAY = 48  # paper Table II: 30-minute slots


def intensity_field(cfg: CityConfig, side: int = GEN_SIDE) -> np.ndarray:
    """Spatial intensity on a ``side x side`` lattice, normalised to sum 1.

    Index convention: ``field[iy, ix]`` with ``ix`` along x/width and ``iy``
    along y/height; cell centres at ``(ix + 0.5)/side`` in unit coordinates.
    """
    c = (np.arange(side) + 0.5) / side
    gx, gy = np.meshgrid(c, c)  # gx: x coordinate, gy: y coordinate
    # every component is normalised to unit mass, then mixed by its weight,
    # so weights are mass fractions (not peak amplitudes)
    f = np.full((side, side), float(cfg.floor) / side**2)
    for cx, cy, sig, w in cfg.hotspots:
        g = np.exp(-(((gx - cx) ** 2 + (gy - cy) ** 2) / (2 * sig**2)))
        f += w * g / g.sum()
    if cfg.road is not None:
        x0, y0, x1, y1, sig, w = cfg.road
        # distance from each cell centre to the segment (x0,y0)-(x1,y1)
        dx, dy = x1 - x0, y1 - y0
        t = ((gx - x0) * dx + (gy - y0) * dy) / (dx * dx + dy * dy)
        t = np.clip(t, 0.0, 1.0)
        d2 = (gx - (x0 + t * dx)) ** 2 + (gy - (y0 + t * dy)) ** 2
        g = np.exp(-d2 / (2 * sig**2))
        f += w * g / g.sum()
    return f / f.sum()


def temporal_profile(slots: int = SLOTS_PER_DAY) -> np.ndarray:
    """Fraction of a day's orders per slot (sums to 1): AM + PM peaks."""
    t = np.arange(slots)
    prof = (
        0.35
        + 1.2 * np.exp(-(((t - 17 * slots / 48) / (2.5 * slots / 48)) ** 2))
        + 1.4 * np.exp(-(((t - 37 * slots / 48) / (3.5 * slots / 48)) ** 2))
    )
    return prof / prof.sum()


def day_factors(days: int, cfg: CityConfig) -> np.ndarray:
    """Per-day demand multiplier: day 0 is a Monday; weekends are damped."""
    f = np.ones(days)
    f[np.arange(days) % 7 >= 5] = cfg.weekend_factor
    return f


def true_cell_means(
    cfg: CityConfig, *, sf: float, slot: int, side: int = GEN_SIDE,
    slots: int = SLOTS_PER_DAY,
) -> np.ndarray:
    """Ground-truth Poisson mean per generator cell for a weekday ``slot``.

    Tests use this as the oracle for alpha estimation.
    """
    return intensity_field(cfg, side) * (cfg.daily_orders * sf) * temporal_profile(slots)[slot]


def taxi_trips_pdf(
    cfg: CityConfig,
    *,
    sf: float = 0.01,
    days: int = 33,
    slots: int = SLOTS_PER_DAY,
    side: int = GEN_SIDE,
    seed: int | None = None,
) -> pd.DataFrame:
    """Generate a city's trips as pandas (deterministic in ``seed``).

    Columns: ``day`` (0-based, day 0 = Monday), ``slot``, ``x``/``y``
    (origin, km), ``dest_x``/``dest_y`` (km), ``revenue`` (fare). Counts per
    (day, slot, cell) are Poisson(intensity x daily volume x slot profile x
    weekday factor); positions are uniform inside the cell (events are
    homogeneous below the generator lattice by construction).
    """
    g = _rng(cfg.seed if seed is None else seed)
    fld = intensity_field(cfg, side)
    prof = temporal_profile(slots)
    dayf = day_factors(days, cfg)
    flat = fld.ravel()
    cell_w, cell_h = cfg.width_km / side, cfg.height_km / side
    chunks = []
    for d in range(days):
        lam = flat[None, :] * (cfg.daily_orders * sf * dayf[d]) * prof[:, None]
        counts = g.poisson(lam)  # (slots, side*side)
        s_idx, c_idx = np.nonzero(counts)
        reps = counts[s_idx, c_idx]
        slot_col = np.repeat(s_idx, reps)
        cell = np.repeat(c_idx, reps)
        n = cell.size
        if n == 0:
            continue
        ix, iy = cell % side, cell // side
        x = (ix + g.random(n)) * cell_w
        y = (iy + g.random(n)) * cell_h
        dest = g.choice(side * side, size=n, p=flat)
        dx = (dest % side + g.random(n)) * cell_w
        dy = (dest // side + g.random(n)) * cell_h
        dist = np.hypot(dx - x, dy - y)
        revenue = 2.5 + 1.8 * dist * (1.0 + 0.2 * g.standard_normal(n))
        chunks.append(
            pd.DataFrame(
                {
                    "day": np.full(n, d, dtype=np.int32),
                    "slot": slot_col.astype(np.int32),
                    "x": x,
                    "y": y,
                    "dest_x": dx,
                    "dest_y": dy,
                    "revenue": np.maximum(revenue, 1.0).round(2),
                }
            )
        )
    return pd.concat(chunks, ignore_index=True)


def taxi_trips(
    spark: SparkSession,
    cfg: CityConfig,
    *,
    sf: float = 0.01,
    days: int = 33,
    slots: int = SLOTS_PER_DAY,
    side: int = GEN_SIDE,
    seed: int | None = None,
) -> DataFrame:
    """Spark view of :func:`taxi_trips_pdf` (same determinism guarantees)."""
    return spark.createDataFrame(
        taxi_trips_pdf(cfg, sf=sf, days=days, slots=slots, side=side, seed=seed)
    )


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )
