"""Benchmark: Table 6 — Table 3's workload with the SUBSIM RR kernel."""


def test_table6_subsim(benchmark, spark):
    from repro.experiments.tables import _pivot, table6_subsim

    from pathlib import Path

    pivot, records = benchmark.pedantic(
        lambda: table6_subsim(spark), rounds=1, iterations=1
    )
    out = (
        "Table 6: running time (s) using SUBSIM\n"
        + pivot.round(1).to_string(index=False)
        + "\n\nRevenue using SUBSIM\n"
        + _pivot(records, "revenue").round(0).to_string(index=False)
        + "\n"
    )
    Path(__file__).parent.joinpath("results", "table6.txt").write_text(out)
    print("\n" + out)
    assert len(records) == 30
