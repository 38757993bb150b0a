"""Tests for the table builders and the transcribed paper numbers."""
import numpy as np
import pandas as pd
import pytest

from repro.bench import paper_numbers as P
from repro.bench.datasets import ROSTER
from repro.bench.tables import table3, table4, table5, table6, to_markdown_table


class TestPaperNumbersIntegrity:
    def test_table3_has_36_datasets(self):
        assert len(P.TABLE3) == 36
        assert all(len(v) == 11 for v in P.TABLE3.values())

    def test_table3_names_match_roster(self):
        assert set(P.TABLE3) == {s.name for s in ROSTER}

    def test_table4_has_36_rows(self):
        assert len(P.TABLE4) == 36
        for d in P.TABLE4.values():
            assert set(d) == {"FS_R", "NFS", "E-AFE_D", "E-AFE"}

    def test_table4_counts_shape(self):
        """The paper's own claim: E-AFE and E-AFE_D evaluate < ~55% of NFS."""
        ratios = [d["E-AFE"] / d["NFS"] for d in P.TABLE4.values()]
        assert np.mean(ratios) < 0.55
        ratios_d = [d["E-AFE_D"] / d["NFS"] for d in P.TABLE4.values()]
        assert np.mean(ratios_d) < 0.55

    def test_table5_has_36_rows(self):
        assert len(P.TABLE5) == 36
        assert set(P.TABLE5) == {s.name for s in ROSTER}

    def test_table6_values(self):
        assert P.TABLE6["performance"]["NFS"] == pytest.approx(0.183)
        assert P.TABLE6["time"]["NFS"] == pytest.approx(3.75e-6)

    def test_paper_eafe_beats_nfs_on_average(self):
        diffs = [v[10] - v[2] for v in P.TABLE3.values()]  # E-AFE - NFS
        assert np.mean(diffs) > 0

    def test_frames_tidy(self):
        f3 = P.table3_frame()
        assert len(f3) == 36 * 11
        f4 = P.table4_frame()
        assert len(f4) == 36 * 4
        f5 = P.table5_frame()
        assert len(f5) == 36 * 3


@pytest.fixture()
def fake_grid():
    """A synthetic harness output with a known structure."""
    rows = []
    rng = np.random.default_rng(0)
    for ds in ["PimaIndian", "sonar", "labor"]:
        for m, (score, evals, t) in {
            "FS_R": (0.70, 100, 30.0),
            "DL_N": (0.55, 0, 1.0),
            "NFS": (0.74, 90, 25.0),
            "E-AFE_D": (0.73, 45, 8.0),
            "E-AFE": (0.75, 40, 7.0),
        }.items():
            rows.append(
                {
                    "dataset": ds, "task": "C", "method": m,
                    "score": score + rng.normal(scale=0.01),
                    "base_score": 0.65, "time_s": t,
                    "n_generated": 120, "n_evaluated": evals,
                    "gen_time": 0.01, "eval_time": t * 0.9,
                    "svm": 0.7, "nbgp": 0.68, "mlp": 0.66,
                }
            )
    return pd.DataFrame(rows)


class TestBuilders:
    def test_table3_joins_paper(self, fake_grid):
        out = table3(fake_grid)
        assert {"score", "paper_score"} <= set(out.columns)
        row = out[(out.dataset == "PimaIndian") & (out.method == "NFS")].iloc[0]
        assert row["paper_score"] == pytest.approx(0.790)

    def test_table4_ratios(self, fake_grid):
        out = table4(fake_grid)
        eafe = out[(out.method == "E-AFE") & (out.dataset == "sonar")].iloc[0]
        assert eafe["ratio_vs_nfs"] == pytest.approx(40 / 90)
        assert eafe["paper_ratio_vs_nfs"] == pytest.approx(4762 / 9501)

    def test_table5_columns(self, fake_grid):
        out = table5(fake_grid)
        assert {"svm", "nbgp", "mlp", "paper_svm", "paper_nbgp", "paper_mlp"} <= set(out.columns)
        assert set(out["method"]) == {"FS_R", "NFS", "E-AFE"}

    def test_table6_pvalues(self, fake_grid):
        out = table6(fake_grid)
        assert set(out["baseline"]) == {"FS_R", "DL_N", "NFS"}
        assert ((out["p_performance"] >= 0) & (out["p_performance"] <= 1)).all()
        # E-AFE is much faster than FS_R in the fake grid -> significant
        p_time = out[out.baseline == "FS_R"]["p_time"].iloc[0]
        assert p_time < 0.05

    def test_markdown_render(self, fake_grid):
        md = to_markdown_table(table6(fake_grid))
        assert md.startswith("| baseline")
        assert md.count("\n") >= 4
