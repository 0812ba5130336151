"""Shape tests for the per-table experiment harnesses at tiny scale.

These assert the *reproduced shapes* the paper reports (orderings,
monotonicity, invariants), not absolute values -- DESIGN.md section 5
maps each harness to its table.
"""
import numpy as np
import pytest

from repro.harness import fig9, table2, table3, table4, table5, table6, table7, table8, table9
from repro.harness.common import ALL_METHODS, NO_TRAJSTORE
from repro.harness.config import TINY, get


@pytest.fixture(scope="module")
def t2():
    return table2.run(TINY)


@pytest.fixture(scope="module")
def t3():
    return table3.run(TINY)


@pytest.fixture(scope="module")
def sweep56():
    return table5.run(TINY, deviations=(400.0, 800.0)), table6.run(
        TINY, deviations=(400.0, 800.0)
    )


class TestConfig:
    def test_get_by_name(self):
        assert get("tiny").scale == "tiny"
        assert get("bench").scale == "bench"

    def test_datasets_load(self):
        for ds in TINY.datasets:
            pts = ds.load()
            assert pts.traj_id.nunique() == ds.n_traj

    def test_unknown_dataset_raises(self):
        with pytest.raises(KeyError):
            TINY.dataset("mars")


class TestTable2:
    def test_all_methods_both_datasets(self, t2):
        assert set(t2.method) == set(ALL_METHODS)
        assert set(t2.dataset) == {"porto", "geolife"}
        assert len(t2) == 2 * len(ALL_METHODS)

    def test_ppq_cqc_perfect_precision_recall(self, t2):
        for m in ("PPQ-A", "PPQ-S"):
            rows = t2[t2.method == m]
            assert (rows.precision == 1.0).all()
            assert (rows.recall == 1.0).all()

    def test_ppq_beats_budget_baselines_on_mae(self, t2):
        """Paper Table 2: PPQ MAE is orders of magnitude below Q-trajectory
        / RQ / PQ for the same codeword counts."""
        for ds in ("porto", "geolife"):
            sub = t2[t2.dataset == ds].set_index("method")
            for worse in ("Q-trajectory", "Residual Quantization", "Product Quantization"):
                assert sub.loc["PPQ-A", "mae_m"] < sub.loc[worse, "mae_m"]
                assert sub.loc["PPQ-S", "mae_m"] < sub.loc[worse, "mae_m"]

    def test_cqc_beats_basic(self, t2):
        for ds in ("porto", "geolife"):
            sub = t2[t2.dataset == ds].set_index("method")
            assert sub.loc["PPQ-A", "mae_m"] < sub.loc["PPQ-A-basic", "mae_m"]
            assert sub.loc["PPQ-S", "mae_m"] < sub.loc["PPQ-S-basic", "mae_m"]

    def test_geolife_blows_up_nonpredictive(self, t2):
        """The large GeoLife span makes Q-trajectory/RQ/PQ errors explode
        (the paper's 'x' rows)."""
        sub = t2[t2.dataset == "geolife"].set_index("method")
        for m in ("Q-trajectory", "Residual Quantization", "Product Quantization"):
            assert sub.loc[m, "mae_m"] > 10 * sub.loc["PPQ-A", "mae_m"]


class TestTable3:
    def test_mae_grows_with_l(self, t3):
        lcols = [c for c in t3.columns if c.startswith("l=")]
        assert len(lcols) >= 1
        if len(lcols) >= 2:
            for _, row in t3.iterrows():
                vals = [row[c] for c in lcols]
                assert vals == sorted(vals)

    def test_ppq_best(self, t3):
        lcols = [c for c in t3.columns if c.startswith("l=")]
        for ds in ("porto", "geolife"):
            sub = t3[t3.dataset == ds].set_index("method")
            for c in lcols:
                if np.isnan(sub.loc["PPQ-A", c]):
                    continue
                assert sub.loc["PPQ-A", c] < sub.loc["Q-trajectory", c]
                assert sub.loc["PPQ-A", c] < sub.loc["Residual Quantization", c]


class TestTable4:
    def test_structure_and_cqc_ratio_constant(self):
        t4 = table4.run(TINY, bits=(5, 6))
        assert set(t4.method) == set(NO_TRAJSTORE)
        # CQC methods: visited ratio does not move with codebook size
        for m in ("PPQ-A", "PPQ-S"):
            rows = t4[(t4.method == m) & (t4.measure == "ratio")]
            for _, r in rows.iterrows():
                assert r["5bits"] == pytest.approx(r["6bits"], rel=0.2)


class TestTables56:
    def test_methods_and_columns(self, sweep56):
        t5, t6 = sweep56
        assert set(t5.method) == set(ALL_METHODS)
        assert "400m" in t5.columns and "800m" in t6.columns

    def test_codewords_decrease_with_deviation(self, sweep56):
        _, t6 = sweep56
        for _, row in t6.iterrows():
            assert row["800m"] <= row["400m"]

    def test_ppq_fewer_codewords_than_qtrajectory(self, sweep56):
        """Table 6's shape: prediction shrinks the codebook by orders of
        magnitude."""
        _, t6 = sweep56
        for ds in ("porto", "geolife"):
            sub = t6[t6.dataset == ds].set_index("method")
            assert sub.loc["PPQ-A", "400m"] < sub.loc["Q-trajectory", "400m"]
            assert sub.loc["PPQ-S", "400m"] < sub.loc["Q-trajectory", "400m"]

    def test_times_positive(self, sweep56):
        t5, _ = sweep56
        for c in ("400m", "800m"):
            assert (t5[c] > 0).all()


class TestTables78:
    def test_table7_monotone_periods(self):
        t7 = table7.run(TINY, eps_c_values=(0.2, 0.8))
        for ds in ("porto", "geolife"):
            col = t7[f"periods_{ds}"].to_numpy()
            assert col[-1] <= col[0]

    def test_table8_monotone_periods(self):
        t8 = table8.run(TINY, eps_d_values=(0.2, 0.8))
        for ds in ("porto", "geolife"):
            col = t8[f"periods_{ds}"].to_numpy()
            assert col[-1] <= col[0]

    def test_sizes_positive(self):
        t7 = table7.run(TINY, eps_c_values=(0.5,))
        assert (t7.filter(like="size_mb").iloc[0] > 0).all()


class TestTable9:
    def test_rows_and_invariants(self):
        t9 = table9.run(TINY)
        assert set(t9.method) == {"TPI", "PI", "TrajStore"}
        assert (t9.n_ios >= 1).all()
        assert (t9.index_size_mb > 0).all()
        m = t9.set_index(["dataset", "method"])
        for ds in ("porto", "geolife"):
            # the paper's headline: TrajStore does the most I/O
            assert m.loc[(ds, "TrajStore"), "n_ios"] >= m.loc[(ds, "TPI"), "n_ios"]
            # PI builds are costlier than TPI (no structure reuse)
            assert m.loc[(ds, "PI"), "building_s"] >= 0


class TestFig9:
    def test_rest_panel_present(self):
        f9 = fig9.run_sub_porto(TINY, deviations=(400.0,))
        assert "REST" in set(f9.method)
        assert (f9["400m"] > 0).all()

    def test_rest_beats_nothing_matched_case(self):
        """REST compresses sub-Porto (near-duplicates) better than 1x."""
        f9 = fig9.run_sub_porto(TINY, deviations=(400.0,))
        rest = f9[f9.method == "REST"]["400m"].iloc[0]
        assert rest > 1.0
