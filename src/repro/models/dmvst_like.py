"""Dmvst-Net substitute: CPT blend + spatial smoothing + per-grid shrinkage.

Dmvst-Net (Yao et al., AAAI'18) adds a local-CNN spatial view and a
semantic view on top of temporal modelling, and is the most accurate model
in the paper. This substitute adds to the DeepST-like blend (a) a
neighbour-smoothed period feature — the 3x3 MGrid-lattice mean, standing in
for the local spatial view — and (b) a shrunken per-grid residual
correction, standing in for per-region semantic fitting. It is the
strongest of the three substitutes (verified by tests).
"""
import numpy as np

from repro.models.base import flat_index, period_values
from repro.models.deepst_like import DeepSTLike


def _smooth_3x3(values: np.ndarray, side: int) -> np.ndarray:
    """Mean over the 3x3 neighbourhood on a ``side x side`` grid lattice."""
    f = values.reshape(side, side)
    p = np.pad(f, 1, mode="edge")
    out = sum(
        p[1 + dy : 1 + dy + side, 1 + dx : 1 + dx + side]
        for dy in (-1, 0, 1)
        for dx in (-1, 0, 1)
    ) / 9.0
    return out.ravel()


class DmvstLike(DeepSTLike):
    """DeepST-like features + spatial smoothing + shrunken per-grid bias."""

    name = "dmvst"

    def __init__(self, lags: int = 8, period_days: int = 8, trend_weeks: int = 2,
                 shrink_tau: float = 24.0):
        super().__init__(lags, period_days, trend_weeks)
        self.shrink_tau = shrink_tau
        self.bias_: np.ndarray | None = None

    def _features(self, tensor: np.ndarray, day: int, slot: int) -> np.ndarray:
        base = super()._features(tensor, day, slot)  # (n, 4)
        n = base.shape[0]
        side = int(round(np.sqrt(n)))
        period = period_values(tensor, day, slot, self.period_days).mean(0)
        spatial = _smooth_3x3(period, side) if side * side == n else period
        return np.column_stack([base, spatial])

    def fit(
        self, tensor: np.ndarray, train_days: list[int], slot: int | None = None
    ) -> "DmvstLike":
        super().fit(tensor, train_days, slot)
        # per-grid residual bias on the training slots, shrunk toward 0
        days, slots, n = tensor.shape
        resid = np.zeros(n)
        cnt = 0
        for d in train_days:
            if d < 1:
                continue
            for t in range(slots) if slot is None else (slot,):
                if flat_index(d, t, slots) < self.lags:
                    continue
                resid += tensor[d, t, :] - self._features(tensor, d, t) @ self.coef_
                cnt += 1
        shrink = cnt / (cnt + self.shrink_tau)
        self.bias_ = shrink * resid / max(cnt, 1)
        return self

    def predict(self, tensor: np.ndarray, day: int, slot: int) -> np.ndarray:
        if self.coef_ is None or self.bias_ is None:
            raise RuntimeError("fit() first")
        raw = self._features(tensor, day, slot) @ self.coef_ + self.bias_
        return np.maximum(raw, 0.0)
