"""Estimation of the HGrid Poisson means alpha_ij and the unevenness metric
D_alpha(N) (paper §III-A).

``alpha_ij`` is the mean number of events in HGrid ``r_ij`` for one time
slot, estimated — as in the paper — as the average count over the same slot
of the training weekdays ("the average number of events at the same period
of all workdays in last one month", §V-B).

``D_alpha(N) = sum_ij |alpha_ij - mean(alpha)|`` (Eq. 2) measures how
uneven the spatial distribution is; Theorem III.1 shows it saturates once
HGrids are internally uniform, which is how a suitable N is selected.
"""
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.grids import GridSpec, hgrid_lattice, with_grid_ids


def weekday_days(days: range | list[int]) -> list[int]:
    """Weekdays among ``days`` under the generator's convention (day 0 = Monday)."""
    return [d for d in days if d % 7 < 5]


def alpha_by_hgrid(
    spark: SparkSession,
    events: DataFrame,
    spec: GridSpec,
    *,
    slot: int,
    train_days: list[int],
) -> DataFrame:
    """Per-HGrid alpha for one slot: ``(mgrid, hgrid, alpha)``.

    Every HGrid of the lattice appears exactly once (missing = alpha 0);
    alpha = total events over ``train_days`` at ``slot`` divided by the
    number of training days (days with zero events count in the mean).
    """
    if not train_days:
        raise ValueError("train_days must be non-empty")
    counts = (
        with_grid_ids(events, spec)
        .where((F.col("slot") == slot) & F.col("day").isin([int(d) for d in train_days]))
        .groupBy("hgrid")
        .agg((F.count(F.lit(1)) / F.lit(float(len(train_days)))).alias("alpha"))
    )
    return (
        hgrid_lattice(spark, spec)
        .join(counts, "hgrid", "left")
        .select("mgrid", "hgrid", F.coalesce("alpha", F.lit(0.0)).alias("alpha"))
    )


def d_alpha(alpha_df: DataFrame) -> float:
    """``D_alpha(N) = sum_ij |alpha_ij - alpha_bar|`` (Eq. 2) over the lattice."""
    mean = alpha_df.agg(F.avg("alpha")).first()[0]
    return float(
        alpha_df.agg(F.sum(F.abs(F.col("alpha") - F.lit(float(mean))))).first()[0]
    )


@dataclass(frozen=True)
class NSelection:
    """Result of the §III-A procedure: D_alpha per candidate N_side and the
    chosen N_side (first candidate past which relative growth of D_alpha,
    per doubling, falls under ``rel_tol``)."""

    candidates: list[int]
    d_values: list[float]
    chosen_N_side: int


def select_N(
    spark: SparkSession,
    events: DataFrame,
    cfg,
    *,
    slot: int,
    train_days: list[int],
    candidates: list[int] = (8, 16, 32, 64, 128),
    rel_tol: float = 0.10,
) -> NSelection:
    """Pick N by the saturation of D_alpha(N) (paper §III-A / Appendix C).

    Computes D_alpha on an ``N_side x N_side`` lattice for each candidate
    (n_side = N_side here, i.e. nm = N) and picks the first N_side whose
    next doubling grows D_alpha by less than ``rel_tol`` relatively — the
    "turning point" of Fig. 14. Falls back to the largest candidate.
    """
    from repro.core.grids import grid_spec

    cands = sorted(candidates)
    d_values = [
        d_alpha(
            alpha_by_hgrid(
                spark, events, grid_spec(cfg, s, s), slot=slot, train_days=train_days
            )
        )
        for s in cands
    ]
    chosen = cands[-1]
    for i in range(len(cands) - 1):
        prev = d_values[i]
        if prev > 0 and (d_values[i + 1] - prev) / prev < rel_tol:
            chosen = cands[i]
            break
    return NSelection(cands, d_values, chosen)
