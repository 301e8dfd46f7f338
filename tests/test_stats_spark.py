"""Spark ANALYZE (stats.analyze_table) vs the pandas ground truth."""
import pytest

from repro.core.stats import analyze_pandas_table, analyze_table


@pytest.fixture(scope="module")
def spark_ts(spark, ds):
    return analyze_table(ds.spark_df(spark, "keyword"), "keyword")


@pytest.fixture(scope="module")
def pandas_ts(ds):
    return analyze_pandas_table(ds.tables["keyword"], "keyword")


def test_row_counts_agree(spark_ts, pandas_ts):
    assert spark_ts.n_rows == pandas_ts.n_rows


@pytest.mark.parametrize("col", ["id", "keyword_group"])
def test_ndv_exact(spark_ts, pandas_ts, col):
    assert spark_ts.columns[col].ndv == pandas_ts.columns[col].ndv


@pytest.mark.parametrize("col", ["id", "keyword_group"])
def test_min_max_agree(spark_ts, pandas_ts, col):
    assert spark_ts.columns[col].min_val == pandas_ts.columns[col].min_val
    assert spark_ts.columns[col].max_val == pandas_ts.columns[col].max_val


def test_mcv_fractions_agree(spark_ts, pandas_ts):
    got = dict(spark_ts.columns["keyword_group"].mcvs)
    expected = dict(pandas_ts.columns["keyword_group"].mcvs)
    for v, f in expected.items():
        assert got[v] == pytest.approx(f)


def test_enum_table_analyze(spark, ds):
    ts = analyze_table(ds.spark_df(spark, "info_type"), "info_type")
    assert ts.n_rows == 113
    assert ts.columns["id"].ndv == 113
    # the string column is analyzed too (MCVs, no histogram)
    assert ts.columns["label"].hist is None


def test_fact_table_histogram_built(spark, ds):
    ts = analyze_table(ds.spark_df(spark, "movie_keyword"), "movie_keyword")
    cs = ts.columns["movie_id"]
    assert cs.hist is not None and len(cs.hist) > 10
