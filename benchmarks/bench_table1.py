"""Benchmark: Table 1 dataset-statistics generation."""


def test_table1_datasets(benchmark):
    from repro.experiments.tables import table1_datasets

    pdf = benchmark.pedantic(table1_datasets, rounds=1, iterations=1)
    print()
    print(pdf.to_string(index=False))
    assert len(pdf) == 4
