"""Tests for run_ppq and the Summary object (paper Section 3.2)."""
import math

import numpy as np
import pandas as pd
import pytest

from repro import DEG_TO_M
from repro.core.ppq import run_ppq


class TestBounds:
    def test_ppqa_cqc_bound(self, ppqa_summary):
        """With CQC the final error obeys Lemma 3."""
        bound = (math.sqrt(2) / 2) * ppqa_summary.config["gs"] * DEG_TO_M
        assert ppqa_summary.errors_m().max() <= bound + 1e-6

    def test_ppqs_cqc_bound(self, ppqs_summary):
        bound = (math.sqrt(2) / 2) * ppqs_summary.config["gs"] * DEG_TO_M
        assert ppqs_summary.errors_m().max() <= bound + 1e-6

    def test_epq_eps1_bound(self, epq_summary):
        bound = epq_summary.config["eps1"] * DEG_TO_M
        assert epq_summary.errors_m().max() <= bound + 1e-6

    def test_basic_eps1_bound(self, porto_pts):
        s = run_ppq(porto_pts, mode="S", use_cqc=False, eps1=0.002, eps_p=0.02, seed=1)
        assert s.errors_m().max() <= 0.002 * DEG_TO_M + 1e-6

    def test_qtrajectory_bound(self, porto_pts):
        s = run_ppq(
            porto_pts, mode=None, predict=False, use_cqc=False, eps1=0.001, seed=1
        )
        assert s.errors_m().max() <= 0.001 * DEG_TO_M + 1e-6

    def test_cqc_improves_over_basic(self, porto_pts):
        basic = run_ppq(porto_pts, mode="A", use_cqc=False, eps1=0.001, eps_p=0.05)
        cqc = run_ppq(porto_pts, mode="A", use_cqc=True, eps1=0.001, eps_p=0.05)
        assert cqc.mae_m() < basic.mae_m()

    def test_prediction_improves_over_qtrajectory_codebook(self, porto_pts):
        """Same bound -> predictive codebook is smaller (the paper's
        compression story)."""
        epq = run_ppq(porto_pts, mode=None, use_cqc=False, eps1=0.001)
        qtr = run_ppq(porto_pts, mode=None, predict=False, use_cqc=False, eps1=0.001)
        assert epq.n_codewords() < qtr.n_codewords()


class TestCodedFrame:
    def test_one_row_per_point(self, ppqa_summary, porto_pts):
        assert len(ppqa_summary.coded) == len(porto_pts)

    @pytest.mark.parametrize(
        "col",
        ["traj_id", "t", "x", "y", "pid", "code", "xhat", "yhat", "xrec", "yrec", "cqc"],
    )
    def test_columns(self, ppqa_summary, col):
        assert col in ppqa_summary.coded.columns

    def test_cqc_codes_present_when_enabled(self, ppqa_summary):
        assert (ppqa_summary.coded.cqc >= 0).all()

    def test_cqc_codes_absent_when_disabled(self, epq_summary):
        assert (epq_summary.coded.cqc == -1).all()
        assert np.allclose(epq_summary.coded.xrec, epq_summary.coded.xhat)

    def test_codes_decode_via_codebooks(self, ppqa_summary):
        """Self-describing summary: xhat = prediction + codeword, so
        xhat - codeword must be finite and codes index into the pid's
        codebook."""
        for pid, grp in ppqa_summary.coded.groupby("pid"):
            cb = ppqa_summary.codebooks[pid]
            assert grp.code.max() < len(cb)

    def test_multiple_partitions_used(self, ppqs_summary):
        assert ppqs_summary.coded.pid.nunique() > 1

    def test_single_partition_for_epq(self, epq_summary):
        assert epq_summary.coded.pid.nunique() == 1


class TestReconstructionIsStoredFunction:
    def test_recon_equals_pred_plus_codeword_plus_cqc(self, ppqa_summary):
        """Rebuild xrec/yrec from the stored summary parts for a sample of
        rows and compare to the materialised columns."""
        s = ppqa_summary
        sample = s.coded.sample(n=min(200, len(s.coded)), random_state=0)
        for row in sample.itertuples(index=False):
            cw = s.codebooks[row.pid][row.code]
            d = s.cqc.decode(np.array([row.cqc]))[0]
            # xhat = pred + codeword  =>  pred = xhat - codeword
            assert np.isfinite(cw).all()
            assert row.xrec == pytest.approx(row.xhat + d[0], abs=1e-12)
            assert row.yrec == pytest.approx(row.yhat + d[1], abs=1e-12)


class TestModes:
    def test_bad_mode_raises(self, porto_pts):
        with pytest.raises(ValueError):
            run_ppq(porto_pts, mode="X")

    def test_per_t_codebooks(self, porto_pts):
        s = run_ppq(
            porto_pts, mode="A", use_cqc=False, eps1=0.001, eps_p=0.05,
            codebook_mode="per_t",
        )
        assert len(s.codebooks_t) > 0
        assert len(s.codebooks) == 0
        assert s.errors_m().max() <= 0.001 * DEG_TO_M + 1e-6

    def test_fixed_bits_budget_respected(self, porto_pts):
        s = run_ppq(
            porto_pts, mode=None, use_cqc=False, eps1=0.001,
            codebook_mode="fixed", fixed_bits=4,
        )
        for (_pid, t), cb in s.codebooks_t.items():
            assert len(cb) <= 16

    def test_budget_t_override(self, porto_pts):
        ts = sorted(porto_pts.t.unique())
        budget = {int(t): 3 for t in ts}
        s = run_ppq(
            porto_pts, mode=None, use_cqc=False, eps1=0.001,
            codebook_mode="fixed", budget_t=budget,
        )
        for (_pid, t), cb in s.codebooks_t.items():
            assert len(cb) <= 3

    def test_partition_stats_collected(self, ppqa_summary, porto_pts):
        assert len(ppqa_summary.partition_stats) == porto_pts.t.nunique()

    def test_partition_count_stabilizes(self, ppqs_summary):
        """Fig. 8's shape: q stops growing after the early timesteps."""
        qs = [st.q for st in ppqs_summary.partition_stats]
        early_growth = qs[len(qs) // 2] - qs[0]
        late_growth = qs[-1] - qs[len(qs) // 2]
        assert late_growth <= max(2, early_growth)


class TestSizeAccounting:
    def test_summary_bits_positive(self, ppqa_summary):
        assert ppqa_summary.summary_bits() > 0

    def test_compression_ratio_definition(self, ppqa_summary):
        raw = ppqa_summary.n_points * 2 * 64
        assert ppqa_summary.compression_ratio() == pytest.approx(
            raw / ppqa_summary.summary_bits()
        )

    def test_cqc_costs_bits(self, porto_pts):
        basic = run_ppq(porto_pts, mode="S", use_cqc=False, eps1=0.001, eps_p=0.02)
        cqc = run_ppq(porto_pts, mode="S", use_cqc=True, eps1=0.001, eps_p=0.02)
        # identical quantization, CQC adds code bits -> lower ratio
        assert cqc.compression_ratio() < basic.compression_ratio()

    def test_looser_bound_fewer_codewords(self, porto_pts):
        tight = run_ppq(porto_pts, mode=None, use_cqc=False, eps1=0.0005)
        loose = run_ppq(porto_pts, mode=None, use_cqc=False, eps1=0.004)
        assert loose.n_codewords() < tight.n_codewords()


class TestPathAccess:
    def test_path_returns_window(self, ppqa_summary, porto_pts):
        tid = int(porto_pts.traj_id.iloc[0])
        p = ppqa_summary.path(tid, 1, 5)
        assert len(p) == 6  # t in [1, 6]
        assert "xrec" in p.columns

    def test_path_missing_traj_empty(self, ppqa_summary):
        assert len(ppqa_summary.path(10**9, 1, 5)) == 0

    def test_build_seconds_recorded(self, ppqa_summary):
        assert ppqa_summary.build_seconds > 0
