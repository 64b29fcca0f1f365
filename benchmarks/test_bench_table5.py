"""Benchmarks for Table 5: SotA comparisons.

(a) blocking: DeepBlocker vs the S-GTR-T5 NNS pipeline (k = 10);
(b) unsupervised matching: ZeroER vs the end-to-end S-GTR-T5 pipeline.

Run here on the small D1/D2; the full 10-dataset sweeps are
`jobs/table5a_blocking_sota.py` / `jobs/table5b_unsup_sota.py`.
"""
import pytest

from repro.baselines import deepblocker, zeroer
from repro.core.matching import candidate_pairs
from repro.core.models import MODELS
from repro.core.pipeline import end_to_end
from repro.data.er_datasets import generate


@pytest.fixture(scope="module")
def d2(spark):
    return generate(spark, "D2")


@pytest.fixture(scope="module")
def d1(spark):
    return generate(spark, "D1")


@pytest.mark.benchmark(group="table5a")
def test_deepblocker_d2(benchmark, spark, d2):
    df1, df2, _ = d2
    r = benchmark.pedantic(
        lambda: deepblocker.block(spark, df1, df2, 10, seed=0),
        rounds=1, iterations=1)
    assert len(r.cands) > 0


@pytest.mark.benchmark(group="table5a")
def test_s_gtr_t5_blocking_d2(benchmark, spark, d2):
    df1, df2, _ = d2
    pairs, *_ = benchmark.pedantic(
        lambda: candidate_pairs(spark, df1, df2, MODELS["S5"], k_cand=10),
        rounds=1, iterations=1)
    assert len(pairs) > 0


@pytest.mark.benchmark(group="table5b")
def test_zeroer_d1(benchmark, spark, d1):
    df1, df2, gt = d1
    r = benchmark.pedantic(lambda: zeroer.run(spark, df1, df2, gt),
                           rounds=1, iterations=1)
    assert r.f1 < 0.35  # paper: ZeroER fails on D1


@pytest.mark.benchmark(group="table5b")
def test_s_gtr_t5_end_to_end_d1(benchmark, spark, d1):
    df1, df2, gt = d1
    r = benchmark.pedantic(lambda: end_to_end(spark, df1, df2, gt),
                           rounds=1, iterations=1)
    assert r.t_match < r.t_preprocess
