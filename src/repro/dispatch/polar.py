"""POLAR-style dispatcher policy (substitute for Tong et al., VLDB'17).

POLAR's goal is to maximise the number of served orders; its first stage
pre-assigns drivers to regions by the *predicted order count*. The policy
here is exactly that stage-1 weight: the per-MGrid demand forecast spread
uniformly over the positioning lattice.
"""
import numpy as np

from repro.core.grids import GridSpec
from repro.dispatch.simulator import spread_to_cells


def polar_weights(pred_by_slot: np.ndarray, spec: GridSpec, P: int) -> np.ndarray:
    """(slots, n)-shaped MGrid count forecasts -> (slots, P*P) cell weights."""
    return np.stack([spread_to_cells(p, spec, P) for p in pred_by_slot])
