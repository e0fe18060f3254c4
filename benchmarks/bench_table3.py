"""Benchmark: Table III — generation of the five lite dataset analogues."""
from repro.experiments.tables import table3


def test_table3_generation(benchmark):
    df = benchmark.pedantic(table3, rounds=1, iterations=1)
    assert len(df) == 5
    print()
    print(df.to_string(index=False))
