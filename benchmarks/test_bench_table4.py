"""Benchmark for Table 4: vectorization (init + transform) per model.

Runs the representative mid-size dataset D2 through every model once; the
full 12×10 sweep is `jobs/table4_vectorization.py` (memoized in results/).
"""
import pytest

from repro.core.models import MODELS
from repro.core.tokenize import with_sentence
from repro.core.vectorize import init_model, vectorize
from repro.data.er_datasets import generate


@pytest.fixture(scope="module")
def d2(spark):
    df1, df2, _ = generate(spark, "D2")
    return with_sentence(df1).cache(), with_sentence(df2).cache()


@pytest.mark.benchmark(group="table4-vectorize")
@pytest.mark.parametrize("code", list(MODELS))
def test_vectorization(benchmark, spark, d2, code):
    spec = MODELS[code]
    init_model(spec)

    def run():
        a, b = d2
        n = vectorize(a, spec).count() + vectorize(b, spec).count()
        return n

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n == 2152


@pytest.mark.benchmark(group="table4-init")
@pytest.mark.parametrize("code", ["WC", "FT", "GE", "BT", "S5"])
def test_initialization(benchmark, code):
    t = benchmark.pedantic(lambda: init_model(MODELS[code]),
                           rounds=1, iterations=1)
    assert t > 0
