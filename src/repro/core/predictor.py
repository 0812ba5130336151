"""Linear AR(k) prediction for trajectory points (paper Eq. 1-2).

At each timestep a single coefficient vector ``P[t] in R^k`` is fit per
partition by least squares so that ``T_i^t ~= sum_j P_j[t] * That_i^{t-j}``
over all active trajectories i in the partition, where ``That`` are the
*reconstructed* previous points (Eq. 2 -- prediction must use what the
decoder has, otherwise encoder and decoder drift apart).

``History`` keeps, per trajectory, the last k reconstructed points.
"""
from __future__ import annotations

import numpy as np

DEFAULT_K = 2
"""AR order. The paper does not state its k; AR(2) captures the
constant-velocity regime dominant in vehicle data (see DESIGN.md)."""


def fit_coeffs(hist: np.ndarray, cur: np.ndarray, *, ridge: float = 1e-10) -> np.ndarray:
    """Least-squares fit of P[t] (shape (k,)) from history to current points.

    ``hist`` has shape (n, k, 2) with hist[:, j-1] the reconstruction at
    t-j; ``cur`` has shape (n, 2). The x and y equations share the same
    coefficients (the paper's f is one function per partition), so both
    axes are stacked into one regression. A tiny ridge keeps the solve
    stable when histories are collinear (e.g. stationary objects).
    """
    n, k, _ = hist.shape
    a = np.concatenate([hist[:, :, 0], hist[:, :, 1]], axis=0)  # (2n, k)
    b = np.concatenate([cur[:, 0], cur[:, 1]], axis=0)  # (2n,)
    ata = a.T @ a + ridge * np.eye(k) * max(1.0, np.abs(a).max() ** 2)
    atb = a.T @ b
    try:
        return np.linalg.solve(ata, atb)
    except np.linalg.LinAlgError:
        return np.linalg.lstsq(a, b, rcond=None)[0]


def predict(hist: np.ndarray, coeffs: np.ndarray) -> np.ndarray:
    """Apply P[t]: (n, k, 2) x (k,) -> (n, 2) predictions (Eq. 2)."""
    return np.einsum("nkd,k->nd", hist, coeffs)


class History:
    """Per-trajectory ring buffers of the last k reconstructed points."""

    def __init__(self, k: int = DEFAULT_K):
        self.k = k
        self._buf: dict[int, np.ndarray] = {}
        self._count: dict[int, int] = {}

    def count(self, traj_id: int) -> int:
        """Number of reconstructions pushed so far for ``traj_id``."""
        return self._count.get(traj_id, 0)

    def warm_ids(self, ids: np.ndarray) -> np.ndarray:
        """Boolean mask over ``ids``: has a full k-length history."""
        return np.fromiter(
            (self.count(int(i)) >= self.k for i in ids), dtype=bool, count=len(ids)
        )

    def matrix(self, ids: np.ndarray) -> np.ndarray:
        """History tensor (n, k, 2); hist[:, j-1] is the point at t-j.

        All ids must be warm (``warm_ids`` true).
        """
        return np.stack([self._buf[int(i)] for i in ids])

    def push(self, ids: np.ndarray, recon: np.ndarray) -> None:
        """Record reconstructed points for this timestep."""
        for i, p in zip(ids, recon):
            i = int(i)
            buf = self._buf.get(i)
            if buf is None:
                buf = np.zeros((self.k, 2))
                self._buf[i] = buf
            buf[1:] = buf[:-1]
            buf[0] = p
            self._count[i] = self._count.get(i, 0) + 1

    def last(self, traj_id: int) -> np.ndarray | None:
        """Most recent reconstruction for ``traj_id`` (or None)."""
        if self.count(traj_id) == 0:
            return None
        return self._buf[traj_id][0].copy()
