"""Benchmark for Table 6: supervised matching train/test cost per model.

Runs the small DSM2 through a static / BERT / SentenceBERT representative;
the full 10×5 sweep is `jobs/table6_supervised.py` (memoized).
"""
import pytest

from repro.core.supervised import train_eval
from repro.data import dsm


@pytest.fixture(scope="module")
def dsm2_data():
    return dsm.generate_pandas("DSM2")


@pytest.mark.benchmark(group="table6")
@pytest.mark.parametrize("code", ["GE", "FT", "RA", "DT", "SM", "XT"])
def test_supervised_train_eval(benchmark, dsm2_data, code):
    r = benchmark.pedantic(
        lambda: train_eval("DSM2", code, data=dsm2_data, epochs=8),
        rounds=1, iterations=1)
    assert 0 <= r.f1 <= 1
