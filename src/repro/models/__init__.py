"""Prediction-model substrate (paper §V-B substitutes — see DESIGN.md §4).

Three per-MGrid demand predictors of increasing accuracy stand in for the
paper's MLP / DeepST / Dmvst-Net (which need GPU training stacks that are
not available offline). What the reproduction needs from them — and what
these preserve — is (a) MAE(MLP) > MAE(DeepST) > MAE(Dmvst), (b) total
model error ~ n*MAE growing with n (Eq. 20), (c) "a more accurate model
shifts the optimal n upward" (§V-C).
"""
from repro.models.base import Predictor
from repro.models.flat_mlp import FlatMLP
from repro.models.deepst_like import DeepSTLike
from repro.models.dmvst_like import DmvstLike

MODELS = {"mlp": FlatMLP, "deepst": DeepSTLike, "dmvst": DmvstLike}

__all__ = ["Predictor", "FlatMLP", "DeepSTLike", "DmvstLike", "MODELS"]
