"""Benchmark: Table I (running example) — exact scores for 6 seed sets."""
from repro.experiments.tables import table1


def test_table1(benchmark):
    df = benchmark(table1)
    assert df["cumulative"].tolist() == [2.55, 3.30, 2.80, 3.15, 2.80, 3.55]
