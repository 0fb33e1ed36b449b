"""Benchmark: Table 5 — RMA running time as τ varies."""


def test_table5_tau(benchmark, spark):
    from repro.experiments.tables import table5_tau

    from pathlib import Path

    rows, _ = benchmark.pedantic(
        lambda: table5_tau(spark), rounds=1, iterations=1
    )
    out = (
        "Table 5: running time (s) when τ changes\n"
        + rows.round(2).to_string(index=False)
        + "\n"
    )
    Path(__file__).parent.joinpath("results", "table5.txt").write_text(out)
    print("\n" + out)
    assert (rows["algo"] == "RMA").sum() == 6
