"""Tests for UMC / Exact / Kiraly clustering and the δ-sweep."""
import numpy as np
import pandas as pd
import pytest

from repro.core import clustering as C


def P(rows):
    return pd.DataFrame(rows, columns=["id1", "id2", "sim"])


class TestUMC:
    def test_greedy_order(self):
        pairs = P([(1, 10, 0.9), (1, 11, 0.8), (2, 10, 0.85)])
        m = C.umc(pairs)
        # 1-10 matched first (0.9); 2-10 blocked; 1-11 blocked (1 used)
        assert list(map(tuple, m[["id1", "id2"]].to_numpy())) == [(1, 10)]

    def test_one_to_one(self):
        g = np.random.default_rng(0)
        pairs = P([(i, 100 + j, float(g.random()))
                   for i in range(20) for j in range(20)])
        m = C.umc(pairs)
        assert m["id1"].is_unique and m["id2"].is_unique

    def test_threshold(self):
        pairs = P([(1, 10, 0.9), (2, 11, 0.3)])
        m = C.umc(pairs, delta=0.5)
        assert len(m) == 1

    def test_early_exit_n_left(self):
        pairs = P([(1, 10, 0.9), (1, 11, 0.8), (2, 12, 0.7), (3, 13, 0.6)])
        m = C.umc(pairs, n_left=2)
        assert len(m) == 2

    def test_empty(self):
        m = C.umc(P([]))
        assert len(m) == 0

    def test_prefix_property(self):
        """UMC(δ) equals UMC(0) truncated at sim ≥ δ — the sweep identity."""
        g = np.random.default_rng(1)
        pairs = P([(i, 100 + j, round(float(g.random()), 3))
                   for i in range(30) for j in range(30)])
        full = C.umc(pairs)
        for d in (0.2, 0.5, 0.8):
            direct = C.umc(pairs, delta=d)
            via_prefix = full[full["sim"] >= d]
            assert (sorted(map(tuple, direct[["id1", "id2"]].to_numpy()))
                    == sorted(map(tuple, via_prefix[["id1", "id2"]].to_numpy())))

    def test_deterministic_ties(self):
        pairs = P([(2, 11, 0.5), (1, 10, 0.5), (1, 11, 0.5)])
        a = C.umc(pairs)
        b = C.umc(pairs.sample(frac=1.0, random_state=3))
        assert a[["id1", "id2"]].to_numpy().tolist() == b[["id1", "id2"]].to_numpy().tolist()


class TestExact:
    def test_mutual_best(self):
        pairs = P([(1, 10, 0.9), (1, 11, 0.5), (2, 10, 0.8), (2, 11, 0.7)])
        m = C.exact_clustering(pairs)
        # 1's best is 10; 10's best is 1 → matched. 2's best is 10 (taken→not mutual), 11's best is 2 but 2's best isn't 11.
        assert list(map(tuple, m[["id1", "id2"]].to_numpy())) == [(1, 10)]

    def test_empty(self):
        assert len(C.exact_clustering(P([]))) == 0

    def test_subset_of_umc_quality(self):
        g = np.random.default_rng(2)
        pairs = P([(i, 100 + j, float(g.random()))
                   for i in range(15) for j in range(15)])
        m = C.exact_clustering(pairs)
        assert m["id1"].is_unique and m["id2"].is_unique


class TestKiraly:
    def test_basic(self):
        pairs = P([(1, 10, 0.9), (2, 10, 0.95), (2, 11, 0.5)])
        m = C.kiraly(pairs)
        got = set(map(tuple, m[["id1", "id2"]].to_numpy()))
        assert (2, 10) in got

    def test_one_to_one(self):
        g = np.random.default_rng(3)
        pairs = P([(i, 100 + j, float(g.random()))
                   for i in range(12) for j in range(12)])
        m = C.kiraly(pairs)
        assert m["id1"].is_unique and m["id2"].is_unique

    def test_correlates_with_umc(self):
        """Fig. 2: UMC / EXC / KRC produce highly correlated outcomes."""
        g = np.random.default_rng(4)
        # planted matching: (i, 100+i) strong, noise elsewhere
        rows = []
        for i in range(40):
            for j in range(40):
                s = 0.9 + 0.1 * g.random() if i == j else 0.5 * g.random()
                rows.append((i, 100 + j, s))
        pairs = P(rows)
        truth = {(i, 100 + i) for i in range(40)}

        def f1(m):
            hit = sum((a, b) in truth for a, b in zip(m["id1"], m["id2"]))
            p = hit / max(len(m), 1)
            r = hit / len(truth)
            return 2 * p * r / max(p + r, 1e-9)

        assert f1(C.umc(pairs)) > 0.95
        assert f1(C.exact_clustering(pairs)) > 0.9
        assert f1(C.kiraly(pairs)) > 0.9


class TestSweep:
    def _setup(self):
        matches = P([(1, 10, 0.9), (2, 11, 0.7), (3, 12, 0.4), (4, 13, 0.2)])
        gt = pd.DataFrame({"id1": [1, 2, 3, 5], "id2": [10, 11, 12, 14]})
        return matches, gt

    def test_monotone_recall(self):
        m, gt = self._setup()
        sw = C.sweep(m, gt)
        assert (np.diff(sw["recall"]) <= 1e-12).all()  # recall falls with δ

    def test_values(self):
        m, gt = self._setup()
        sw = C.sweep(m, gt, thresholds=np.array([0.5]))
        # δ=0.5 keeps (1,10,0.9),(2,11,0.7): both hits, P=1, R=2/4
        row = sw.iloc[0]
        assert row["precision"] == 1.0
        assert row["recall"] == 0.5
        assert abs(row["f1"] - 2 / 3) < 1e-9

    def test_best_f1(self):
        m, gt = self._setup()
        best = C.best_f1(m, gt)
        # δ≤0.4 keeps 3 hits of 4 emitted? (0.2 pair is a miss) →
        # at δ=0.4: kept 3, hits 3, P=1, R=0.75, F1≈0.857 (max)
        assert abs(best["f1"] - 6 / 7) < 1e-9
        assert best["delta"] <= 0.4

    def test_grid_default(self):
        m, gt = self._setup()
        sw = C.sweep(m, gt)
        assert len(sw) == 19  # 0.05..0.95 step 0.05 (paper's grid)

    def test_empty_matches(self):
        gt = pd.DataFrame({"id1": [1], "id2": [10]})
        sw = C.sweep(P([]), gt)
        assert (sw["f1"] == 0).all()
