"""Tests for the experiment harness (table builders)."""
import pandas as pd
import pytest

from repro import harness as H


class TestTable1:
    def test_twelve_rows(self):
        t = H.table1()
        assert len(t) == 12
        assert list(t.columns) == ["code", "model", "family", "dim",
                                   "max_seq", "params_M"]

    def test_matches_paper_entries(self):
        t = H.table1().set_index("code")
        assert t.loc["S5", "model"] == "S-GTR-T5"
        assert t.loc["SM", "dim"] == 384
        assert t.loc["AT", "params_M"] == 12


class TestTable2:
    def test_2a_all_datasets(self):
        t = H.table2a()
        assert len(t) == 10
        # paper's exact counts reproduced
        row = t.set_index("dataset").loc["D9"]
        assert (row["V1"], row["V2"], row["D"]) == (2516, 61353, 2308)

    def test_2a_lengths_tracked(self):
        t = H.table2a()
        ratio = t["avg_len"] / t["paper_avg_len"]
        assert ((ratio > 0.5) & (ratio < 1.6)).all()

    def test_2b(self):
        t = H.table2b(sizes=(10_000,))
        row = t.iloc[0]
        assert row["n"] == 10_000
        assert abs(row["D_pairs"] - row["paper_D_pairs"]) / row["paper_D_pairs"] < 0.1
        assert 0.38 <= row["matched_frac"] <= 0.42


class TestTable3:
    def test_counts(self):
        t = H.table3().set_index("dataset")
        for name in ("DSM1", "DSM2", "DSM3", "DSM4", "DSM5"):
            assert t.loc[name, "total_pairs"] == t.loc[name, "paper_pairs"]
            assert t.loc[name, "duplicates"] == t.loc[name, "paper_dups"]


class TestProjections:
    @pytest.fixture(scope="class")
    def fake_results(self):
        rows = []
        for ds in ("D1", "D2"):
            for m in ("GE", "S5"):
                rows.append({
                    "dataset": ds, "model": m, "t_init": 1.0,
                    "t_vectorize": 2.0, "t_nns": 0.5, "t_umc": 0.1,
                    "recall@1": 0.5, "recall@5": 0.7, "recall@10": 0.8,
                    "best_delta": 0.5, "precision": 0.6, "recall": 0.7,
                    "f1": 0.65})
        return pd.DataFrame(rows)

    def test_table4_layout(self, fake_results):
        t = H.table4(fake_results)
        assert "Init" in t.index
        assert "D1" in t.index and "GE" in t.columns

    def test_fig3_long_format(self, fake_results):
        t = H.fig3_blocking_recall(fake_results)
        assert len(t) == 2 * 2 * 3
        assert set(t["k"]) == {1, 5, 10}

    def test_fig8_columns(self, fake_results):
        t = H.fig8_unsup(fake_results)
        assert {"dataset", "model", "f1"}.issubset(t.columns)


class TestEvaluateSmall:
    def test_evaluate_d1(self, spark):
        r = H.evaluate(spark, "D1", "GE", k_cand=20)
        assert r["dataset"] == "D1" and r["model"] == "GE"
        assert 0 <= r["recall@10"] <= 1
        assert r["recall@1"] <= r["recall@5"] <= r["recall@10"]
        assert r["t_vectorize"] > 0
