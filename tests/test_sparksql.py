"""Real SparkSQL baseline: the shared SQL runs on Catalyst and agrees
with DuckDB AND with the engine, row for row."""
import pytest

from repro import oracle
from repro.queries.tpch import QUERIES
from repro.sparkbridge.sparksql import register_views, run_query, time_query


@pytest.fixture(scope="module")
def views(spark, db):
    register_views(spark, db)
    return db


@pytest.mark.parametrize("qname", list(QUERIES))
def test_sparksql_matches_oracle(spark, views, qname):
    df = run_query(spark, qname)
    oracle.assert_equivalent(df, QUERIES[qname].sql, **views)


@pytest.mark.parametrize("qname", ["q1", "q9"])
def test_sparksql_matches_engine(spark, views, qname, runner):
    """Three-way agreement: engine == SparkSQL (both oracle-checked)."""
    import pandas as pd

    spark_pdf = run_query(spark, qname).toPandas()
    engine_pdf = runner.run(qname).df
    cols = sorted(spark_pdf.columns)

    def canon(pdf):
        pdf = pdf[cols].sort_values(cols).reset_index(drop=True)
        return pdf

    pd.testing.assert_frame_equal(
        canon(engine_pdf), canon(spark_pdf), check_dtype=False,
        check_exact=False, rtol=1e-6, atol=1e-9,
    )


def test_time_query_returns_positive(spark, views):
    assert time_query(spark, "q6") > 0.0
