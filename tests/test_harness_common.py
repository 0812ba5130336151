"""Tests for the shared method builders in repro.harness.common."""
import math

import numpy as np
import pytest

from repro import DEG_TO_M
from repro.harness.common import (
    ALL_METHODS,
    NO_TRAJSTORE,
    PPQ_METHODS,
    build_bounded_suite,
    build_fixed_bits_suite,
    build_per_t_suite,
)
from repro.harness.config import TINY


@pytest.fixture(scope="module")
def porto_ds():
    return TINY.datasets[0]


@pytest.fixture(scope="module")
def porto_points(porto_ds):
    return porto_ds.load()


@pytest.fixture(scope="module")
def per_t_suite(porto_points, porto_ds):
    return build_per_t_suite(porto_points, TINY, porto_ds)


@pytest.fixture(scope="module")
def bounded_suite(porto_points, porto_ds):
    return build_bounded_suite(porto_points, TINY, porto_ds, 400.0)


class TestMethodLists:
    def test_all_methods(self):
        assert len(ALL_METHODS) == 9
        assert "TrajStore" in ALL_METHODS
        assert "TrajStore" not in NO_TRAJSTORE
        assert set(PPQ_METHODS) < set(ALL_METHODS)


class TestPerTSuite:
    def test_all_methods_built(self, per_t_suite):
        assert set(per_t_suite) == set(ALL_METHODS)

    def test_recon_frames_cover_all_points(self, per_t_suite, porto_points):
        for m, r in per_t_suite.items():
            assert len(r.recon) == len(porto_points), m
            assert set(r.recon.columns) >= {"traj_id", "t", "x", "y", "xrec", "yrec"}

    def test_cqc_methods_flagged(self, per_t_suite):
        for m in ("PPQ-A", "PPQ-S"):
            assert per_t_suite[m].verified
            assert per_t_suite[m].local_radius_deg == pytest.approx(
                math.sqrt(2) / 2 * TINY.gs
            )
        for m in ("PPQ-A-basic", "E-PQ", "Q-trajectory"):
            assert not per_t_suite[m].verified

    def test_error_bounded_methods_respect_eps1(self, per_t_suite):
        for m in ("PPQ-A-basic", "PPQ-S-basic", "E-PQ"):
            r = per_t_suite[m].recon
            err = np.sqrt((r.x - r.xrec) ** 2 + (r.y - r.yrec) ** 2)
            assert err.max() <= TINY.eps1 + 1e-12, m

    def test_budget_baselines_worse_than_ppq(self, per_t_suite):
        for m in ("Q-trajectory", "Residual Quantization", "Product Quantization"):
            assert per_t_suite[m].mae_m() > per_t_suite["PPQ-A"].mae_m()

    def test_build_seconds_recorded(self, per_t_suite):
        for r in per_t_suite.values():
            assert r.build_seconds > 0

    def test_summary_bits_positive(self, per_t_suite):
        for r in per_t_suite.values():
            assert r.summary_bits > 0


class TestFixedBitsSuite:
    def test_subset_build(self, porto_points, porto_ds):
        suite = build_fixed_bits_suite(
            porto_points, TINY, porto_ds, 5, methods=["PPQ-A", "Q-trajectory"]
        )
        assert set(suite) == {"PPQ-A", "Q-trajectory"}

    def test_budget_respected(self, porto_points, porto_ds):
        suite = build_fixed_bits_suite(
            porto_points, TINY, porto_ds, 4, methods=["E-PQ"]
        )
        s = suite["E-PQ"].summary
        for (_pid, _t), cb in s.codebooks_t.items():
            assert len(cb) <= 16


class TestBoundedSuite:
    def test_all_methods(self, bounded_suite):
        assert set(bounded_suite) == set(ALL_METHODS)

    def test_deviation_bounds(self, bounded_suite):
        """Every method's max deviation is within its target bound."""
        for m in ("PPQ-A-basic", "PPQ-S-basic", "E-PQ", "Q-trajectory",
                  "Residual Quantization", "Product Quantization", "TrajStore"):
            r = bounded_suite[m].recon
            err = np.sqrt((r.x - r.xrec) ** 2 + (r.y - r.yrec) ** 2) * DEG_TO_M
            assert err.max() <= 400.0 + 1e-6, m
        for m in ("PPQ-A", "PPQ-S"):
            # paper setting: gs = sqrt(2)*dev, bound = (sqrt(2)/2)*gs = dev
            r = bounded_suite[m].recon
            err = np.sqrt((r.x - r.xrec) ** 2 + (r.y - r.yrec) ** 2) * DEG_TO_M
            assert err.max() <= 400.0 + 1e-6, m

    def test_online_methods_fewer_codewords(self, bounded_suite):
        """Table 6's shape: temporal reuse shrinks the codebook."""
        for online in ("PPQ-A", "PPQ-S", "E-PQ"):
            for per_t in ("Q-trajectory", "Residual Quantization"):
                assert (
                    bounded_suite[online].n_codewords
                    < bounded_suite[per_t].n_codewords
                )

    def test_compression_ratio_shape(self, bounded_suite):
        """Fig. 9's shape: PPQ beats the per-timestamp baselines."""
        for per_t in ("Q-trajectory", "Residual Quantization", "Product Quantization"):
            assert (
                bounded_suite["PPQ-A"].compression_ratio()
                > bounded_suite[per_t].compression_ratio()
            )
