"""Residual Quantization baseline (Chen et al. [8], extended per paper).

Stage s quantizes the residual left by stages 1..s-1 with a k-means
codebook; a point's code is the sequence of per-stage codeword ids.

* ``eps`` mode (Tables 5/6): stages are added until every point's residual
  norm is <= eps; the final stage uses the error-bounded grow quantizer so
  the bound always holds.
* ``n_codewords`` budget mode (Tables 2/4): the budget is split across
  ``n_stages`` equal k-means stages (default 2, the classic RQ setting).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.kmeans import grow_partition, kmeans


@dataclass
class RQResult:
    """Reconstruction + codebook accounting for one RQ fit."""

    recon: np.ndarray
    n_codewords: int
    n_stages: int
    code_bits_per_point: float


def residual_quantize(
    pts: np.ndarray,
    *,
    eps: float | None = None,
    n_codewords: int | None = None,
    stage_size: int = 64,
    n_stages: int = 2,
    max_stages: int = 12,
    seed: int = 0,
) -> RQResult:
    """Quantize (n, 2) points; exactly one of ``eps`` / ``n_codewords``."""
    pts = np.atleast_2d(np.asarray(pts, dtype=np.float64))
    if (eps is None) == (n_codewords is None):
        raise ValueError("pass exactly one of eps / n_codewords")
    recon = np.zeros_like(pts)
    total = 0
    bits = 0.0
    stages = 0
    if eps is not None:
        residual = pts.copy()
        while stages < max_stages - 1:
            err = np.sqrt((residual**2).sum(axis=1))
            if err.max() <= eps:
                break
            k = min(stage_size, len(pts))
            labels, cents = kmeans(residual, k, seed=seed + stages)
            v = len(np.unique(labels))
            recon = recon + cents[labels]
            residual = pts - recon
            total += v
            bits += max(1.0, np.ceil(np.log2(max(2, v))))
            stages += 1
        err = np.sqrt(((pts - recon) ** 2).sum(axis=1))
        if err.max() > eps:
            labels, cents, _ = grow_partition(pts - recon, eps, seed=seed + 99)
            v = len(np.unique(labels))
            recon = recon + cents[labels]
            total += v
            bits += max(1.0, np.ceil(np.log2(max(2, v))))
            stages += 1
    else:
        per_stage = max(1, n_codewords // n_stages)
        residual = pts.copy()
        for s in range(n_stages):
            k = per_stage if s < n_stages - 1 else max(1, n_codewords - total)
            labels, cents = kmeans(residual, k, seed=seed + s)
            v = len(cents)
            recon = recon + cents[labels]
            residual = pts - recon
            total += v
            bits += max(1.0, np.ceil(np.log2(max(2, v))))
            stages += 1
    return RQResult(
        recon=recon, n_codewords=total, n_stages=stages, code_bits_per_point=bits
    )
