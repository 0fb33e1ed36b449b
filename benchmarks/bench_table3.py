"""Benchmark: Table 3 — running time under the linear cost model.

``test_table3_full`` regenerates the whole table (2 datasets × 5 α × 3
algorithms) in one timed pass and prints it; the per-algorithm benches time
one representative cell each so the RMA-vs-baseline gap is visible in the
pytest-benchmark summary.
"""
import pytest

from repro.experiments.harness import run_rma, run_ti
from repro.experiments.instances import get_eval_rr, get_instance
from repro.experiments.tables import EXP, _pivot, table3_runtime


@pytest.fixture(scope="module")
def lastfm(spark):
    exp = EXP["lastfm_lite"]
    inst = get_instance(spark, "lastfm_lite", alpha=0.1, cost_model="linear")
    ev = get_eval_rr(spark, inst, n_eval=exp["n_eval"])
    return spark, inst, ev, exp


def test_cell_rma_lastfm(benchmark, lastfm):
    spark, inst, ev, exp = lastfm
    rec = benchmark.pedantic(
        lambda: run_rma(
            spark, inst, ev, eps=0.02, rho=0.1,
            sample_scale=exp["sample_scale"], rr_cap=exp["rr_cap"],
        ),
        rounds=1, iterations=1,
    )
    assert rec.revenue > 0


def test_cell_ti_carm_lastfm(benchmark, lastfm):
    spark, inst, ev, exp = lastfm
    rec = benchmark.pedantic(
        lambda: run_ti(
            spark, inst, ev, rule="gain", eps=0.1,
            sample_scale=exp["sample_scale"], rr_cap=exp["ti_cap"],
            max_latent=exp["max_latent"],
        ),
        rounds=1, iterations=1,
    )
    assert rec.revenue > 0


def test_cell_ti_csrm_lastfm(benchmark, lastfm):
    spark, inst, ev, exp = lastfm
    rec = benchmark.pedantic(
        lambda: run_ti(
            spark, inst, ev, rule="rate", eps=0.1,
            sample_scale=exp["sample_scale"], rr_cap=exp["ti_cap"],
            max_latent=exp["max_latent"],
        ),
        rounds=1, iterations=1,
    )
    assert rec.revenue > 0


def test_table3_full(benchmark, spark):
    from pathlib import Path

    pivot, records = benchmark.pedantic(
        lambda: table3_runtime(spark), rounds=1, iterations=1
    )
    out = (
        "Table 3: running time (s), linear cost model\n"
        + pivot.round(1).to_string(index=False)
        + "\n\nRevenue at the same settings\n"
        + _pivot(records, "revenue").round(0).to_string(index=False)
        + "\n\nSeed counts (Fig. 3 analogue)\n"
        + _pivot(records, "n_seeds").to_string(index=False)
        + "\n"
    )
    Path(__file__).parent.joinpath("results", "table3.txt").write_text(out)
    print("\n" + out)
    assert len(records) == 30
