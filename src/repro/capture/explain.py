"""Explainable-AI lineage capture, simulated (paper §VII.A.2).

The paper runs LIME and D-RISE over YOLOv4 on a VIRAT frame and turns the
weighted bipartite pixel-to-detection contribution graph into lineage by
thresholding on significance. What reaches DSLog is only that relation:
sets of contributing pixel indices, spatially clumped because both
methods score *regions* (LIME: superpixels; D-RISE: occlusion masks).

This module reproduces the capture output shape without the model (see
DESIGN.md substitutions): a deterministic segmentation of a synthetic
frame, random region weights, and a significance threshold. The result
is partially structured lineage — contiguous pixel ranges within kept
regions — the regime where Table VII reports ProvRC at <0.3% storage.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.capture.model import CapturedLineage


def _region_lineage(keep_mask: np.ndarray, block: int, h: int, w: int, c: int) -> pd.DataFrame:
    """Cell lineage for all pixels (y, x, ch) of kept block regions."""
    gy, gx = keep_mask.shape
    rows = []
    ys, xs = np.nonzero(keep_mask)
    for y0, x0 in zip(ys, xs):
        y_lo, y_hi = y0 * block, min((y0 + 1) * block, h)
        x_lo, x_hi = x0 * block, min((x0 + 1) * block, w)
        yy, xx, cc = np.meshgrid(
            np.arange(y_lo, y_hi), np.arange(x_lo, x_hi), np.arange(c), indexing="ij"
        )
        rows.append(
            pd.DataFrame(
                {
                    "b0": np.zeros(yy.size, dtype="int64"),
                    "a0": yy.ravel(),
                    "a1": xx.ravel(),
                    "a2": cc.ravel(),
                }
            )
        )
    if not rows:
        return pd.DataFrame({c_: pd.Series(dtype="int64") for c_ in ["b0", "a0", "a1", "a2"]})
    return pd.concat(rows, ignore_index=True)


def lime_capture(
    h: int = 416,
    w: int = 416,
    c: int = 3,
    *,
    block: int = 16,
    keep_frac: float = 0.7,
    seed: int = 0,
) -> CapturedLineage:
    """LIME-style capture: superpixel blocks scored, top fraction kept.

    Output array is the 1-cell detection score; lineage links it to every
    pixel of every superpixel whose |weight| clears the significance
    threshold (the paper filters the weighted bipartite graph the same
    way).
    """
    g = np.random.default_rng(seed)
    gy, gx = (h + block - 1) // block, (w + block - 1) // block
    weights = g.normal(size=(gy, gx))
    thresh = np.quantile(np.abs(weights), 1 - keep_frac)
    keep = np.abs(weights) >= thresh
    rel = _region_lineage(keep, block, h, w, c)
    return CapturedLineage(out_shape=(1,), in_shapes=((h, w, c),), relations=[rel])


def drise_capture(
    h: int = 416,
    w: int = 416,
    c: int = 3,
    *,
    grid: int = 13,
    n_masks: int = 200,
    keep_frac: float = 0.25,
    seed: int = 1,
) -> CapturedLineage:
    """D-RISE-style capture: random occlusion masks -> saliency -> threshold.

    Saliency of a coarse grid cell is the weight sum of the random masks
    covering it; cells above the quantile threshold contribute. Coarser
    and sparser than LIME (the paper's DRISE relation is ~1/3 the size of
    its LIME relation).
    """
    g = np.random.default_rng(seed)
    saliency = np.zeros((grid, grid))
    for _ in range(n_masks):
        mask = g.random((grid, grid)) < 0.3
        saliency += mask * g.normal()
    thresh = np.quantile(saliency, 1 - keep_frac)
    keep = saliency >= thresh
    block = (h + grid - 1) // grid
    rel = _region_lineage(keep, block, h, w, c)
    return CapturedLineage(out_shape=(1,), in_shapes=((h, w, c),), relations=[rel])
