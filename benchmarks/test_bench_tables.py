"""Benchmarks for the dataset/registry tables (Tables 1, 2a, 2b, 3).

Each benchmark regenerates its table once (rounds=1) — the wall-clock of
these harnesses is itself a reported artifact (dataset generation cost).
"""
import pytest

from repro import harness as H


@pytest.mark.benchmark(group="tables")
def test_table1_models(benchmark):
    t = benchmark.pedantic(H.table1, rounds=1, iterations=1)
    assert len(t) == 12


@pytest.mark.benchmark(group="tables")
def test_table2a_datasets(benchmark):
    t = benchmark.pedantic(H.table2a, rounds=1, iterations=1)
    assert len(t) == 10
    assert t.set_index("dataset").loc["D10", "D"] == 22863


@pytest.mark.benchmark(group="tables")
def test_table2b_dirty(benchmark):
    t = benchmark.pedantic(lambda: H.table2b(sizes=(10_000, 50_000)),
                           rounds=1, iterations=1)
    assert len(t) == 2


@pytest.mark.benchmark(group="tables")
def test_table3_dsm(benchmark):
    t = benchmark.pedantic(H.table3, rounds=1, iterations=1)
    assert len(t) == 5
    assert (t["total_pairs"] == t["paper_pairs"]).all()
