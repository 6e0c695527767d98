"""Smoke tests: every job entrypoint's main() runs at tiny scale."""
import pytest

from repro.harness.experiments import Harness


@pytest.fixture(scope="module")
def tiny_harness():
    return Harness(sf=0.003, input_batches=8, check_oracle=False)


def test_table1_job():
    from jobs import table1_design_matrix

    rows = table1_design_matrix.main()
    assert len(rows) == 6


def test_fig7_job(tiny_harness):
    from jobs import fig7_pipelining

    rows = fig7_pipelining.main(tiny_harness)
    assert any(r["query"] == "GEOMEAN(II+III)" for r in rows)


def test_fig10_job(tiny_harness):
    from jobs import fig10_recovery

    rows = fig10_recovery.main(tiny_harness)
    assert any("quokka_overhead" in r for r in rows)


def test_fig6_job_with_spark(spark, tiny_harness):
    from jobs import fig6_tpch_comparison

    rows = fig6_tpch_comparison.main(spark, tiny_harness)
    assert any(r["query"] == "GEOMEAN" for r in rows)
