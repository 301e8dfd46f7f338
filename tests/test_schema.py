"""Schema consistency tests: FKs, filterable columns, sizes."""
import pytest

from repro.imdb import gen, schema


@pytest.fixture(scope="module")
def tiny():
    return gen.generate(sf=0.002, seed=7)


def test_all_tables_listed():
    assert set(schema.TABLES) == set(schema.SIZES_SF1) | set(schema.FIXED_SIZES)
    assert len(schema.TABLES) == 14


@pytest.mark.parametrize("table", schema.TABLES)
def test_n_rows_scales_or_is_fixed(table):
    if table in schema.FIXED_SIZES:
        assert schema.n_rows(table, 0.01) == schema.n_rows(table, 1.0)
    else:
        assert schema.n_rows(table, 1.0) == schema.SIZES_SF1[table]
        assert schema.n_rows(table, 0.1) == int(schema.SIZES_SF1[table] * 0.1)


def test_n_rows_never_zero():
    for t in schema.TABLES:
        assert schema.n_rows(t, 1e-9) >= 1


@pytest.mark.parametrize("fk", schema.FK_EDGES, ids=lambda f: f"{f.src}.{f.src_col}")
def test_fk_columns_exist(tiny, fk):
    assert fk.src_col in tiny.tables[fk.src].columns
    assert fk.dst_col in tiny.tables[fk.dst].columns


@pytest.mark.parametrize("fk", schema.FK_EDGES, ids=lambda f: f"{f.src}.{f.src_col}")
def test_fk_referential_integrity(tiny, fk):
    src_vals = set(tiny.tables[fk.src][fk.src_col])
    dst_vals = set(tiny.tables[fk.dst][fk.dst_col])
    assert src_vals <= dst_vals


@pytest.mark.parametrize("fk", schema.FK_EDGES, ids=lambda f: f"{f.src}.{f.src_col}")
def test_fk_dst_is_unique_key(tiny, fk):
    col = tiny.tables[fk.dst][fk.dst_col]
    assert col.is_unique


@pytest.mark.parametrize(
    "table,col",
    [(t, c) for t, cols in schema.FILTERABLE.items() for c in cols],
    ids=lambda x: str(x),
)
def test_filterable_columns_exist(tiny, table, col):
    assert col in tiny.tables[table].columns


@pytest.mark.parametrize("table", schema.TABLES)
def test_min_col_exists(tiny, table):
    assert schema.MIN_COL[table] in tiny.tables[table].columns


def test_facts_all_have_movie_id(tiny):
    for f in schema.FACTS:
        assert "movie_id" in tiny.tables[f].columns
