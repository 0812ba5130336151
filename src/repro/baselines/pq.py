"""Product Quantization baseline (Jegou et al. [19], extended per paper).

For 2-D trajectory points the natural product decomposition is one scalar
sub-quantizer per axis; a point's code is the pair of sub-codeword ids.
Two modes mirror the paper's two experimental regimes:

* ``eps`` mode (Tables 5/6): sub-codebooks grow until the per-point
  Euclidean reconstruction error is <= eps -- each axis is bounded by
  eps/sqrt(2) so the 2-D error is bounded by eps.
* ``n_codewords`` budget mode (Tables 2/4): each axis gets an equal share
  of the codeword budget (the paper counts total codewords; a PQ "codeword"
  is a sub-quantizer centroid, as in its codebook-size accounting).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.kmeans import grow_partition, kmeans


@dataclass
class PQResult:
    """Reconstruction + codebook accounting for one PQ fit."""

    recon: np.ndarray
    n_codewords: int
    code_bits_per_point: float


def _scalar_bounded(vals: np.ndarray, eps: float, seed: int) -> tuple[np.ndarray, int]:
    """1-D quantization with per-value error <= eps. Returns (recon, levels)."""
    labels, cents, _ = grow_partition(vals[:, None], eps, seed=seed)
    return cents[labels][:, 0], int(len(np.unique(labels)))

def _scalar_budget(vals: np.ndarray, levels: int, seed: int) -> tuple[np.ndarray, int]:
    labels, cents = kmeans(vals[:, None], max(1, levels), seed=seed)
    return cents[labels][:, 0], int(len(cents))


def product_quantize(
    pts: np.ndarray,
    *,
    eps: float | None = None,
    n_codewords: int | None = None,
    seed: int = 0,
) -> PQResult:
    """Quantize (n, 2) points; exactly one of ``eps`` / ``n_codewords``."""
    pts = np.atleast_2d(np.asarray(pts, dtype=np.float64))
    if (eps is None) == (n_codewords is None):
        raise ValueError("pass exactly one of eps / n_codewords")
    if eps is not None:
        per_axis = eps / np.sqrt(2.0)
        rx, vx = _scalar_bounded(pts[:, 0], per_axis, seed)
        ry, vy = _scalar_bounded(pts[:, 1], per_axis, seed + 1)
    else:
        half = max(1, n_codewords // 2)
        rx, vx = _scalar_budget(pts[:, 0], half, seed)
        ry, vy = _scalar_budget(pts[:, 1], max(1, n_codewords - half), seed + 1)
    bits = max(1.0, np.ceil(np.log2(max(2, vx)))) + max(
        1.0, np.ceil(np.log2(max(2, vy)))
    )
    return PQResult(
        recon=np.column_stack([rx, ry]), n_codewords=vx + vy, code_bits_per_point=bits
    )
