"""IMDB-lite schema: tables, sizes, and the FK join graph.

A shrunk, synthetic stand-in for the IMDB dataset used by the Join
Order Benchmark. 13 tables: 5 fact-like tables keyed by ``movie_id``
plus dimensions. Sizes scale linearly with the scale factor except for
the four tiny enumeration tables (``info_type`` etc.), which are fixed
— as in real IMDB.

The join graph (``FK_EDGES`` + implicit fact-fact ``movie_id`` equality)
is what the workload generator walks to build JOB-lite queries.
"""
from __future__ import annotations

from dataclasses import dataclass

# Rows at SF=1. Chosen so SF=0.1 is a ~1M-row database (bench scale)
# and SF=0.01 is a ~100k-row database (unit-test scale).
SIZES_SF1: dict[str, int] = {
    "title": 150_000,
    "name": 300_000,
    "char_name": 100_000,
    "keyword": 20_000,
    "company_name": 50_000,
    "cast_info": 1_000_000,
    "movie_keyword": 500_000,
    "movie_companies": 400_000,
    "movie_info": 700_000,
    "movie_info_idx": 200_000,
}

# Enumeration tables whose size never scales (IMDB's info_type has 113
# rows at any scale).
FIXED_SIZES: dict[str, int] = {
    "info_type": 113,
    "kind_type": 7,
    "role_type": 12,
    "company_type": 4,
}

TABLES: tuple[str, ...] = tuple(SIZES_SF1) + tuple(FIXED_SIZES)

#: Fact tables all carrying a ``movie_id`` FK to ``title.id``. Any two
#: of them may also be joined directly on ``movie_id`` (JOB does this).
FACTS: tuple[str, ...] = (
    "cast_info",
    "movie_keyword",
    "movie_companies",
    "movie_info",
    "movie_info_idx",
)


@dataclass(frozen=True)
class FK:
    """``src.src_col`` references ``dst.dst_col`` (dst_col is unique)."""

    src: str
    src_col: str
    dst: str
    dst_col: str


FK_EDGES: tuple[FK, ...] = (
    FK("cast_info", "movie_id", "title", "id"),
    FK("cast_info", "person_id", "name", "id"),
    FK("cast_info", "person_role_id", "char_name", "id"),
    FK("cast_info", "role_id", "role_type", "id"),
    FK("movie_keyword", "movie_id", "title", "id"),
    FK("movie_keyword", "keyword_id", "keyword", "id"),
    FK("movie_companies", "movie_id", "title", "id"),
    FK("movie_companies", "company_id", "company_name", "id"),
    FK("movie_companies", "company_type_id", "company_type", "id"),
    FK("movie_info", "movie_id", "title", "id"),
    FK("movie_info", "info_type_id", "info_type", "id"),
    FK("movie_info_idx", "movie_id", "title", "id"),
    FK("movie_info_idx", "info_type_id", "info_type", "id"),
    FK("title", "kind_id", "kind_type", "id"),
)

#: Columns the workload generator may put filter predicates on, with the
#: predicate style each supports. Skewed/correlated columns are the ones
#: whose filters trip up the uniformity/independence estimator.
FILTERABLE: dict[str, dict[str, str]] = {
    "title": {"production_year": "range", "kind_id": "eq"},
    "name": {"gender": "eq", "name_group": "eq"},
    "char_name": {"name_group": "eq"},
    "keyword": {"keyword_group": "eq"},
    "company_name": {"country_code": "eq"},
    "company_type": {"id": "eq"},
    "info_type": {"id": "eq"},
    "role_type": {"id": "eq"},
    "kind_type": {"id": "eq"},
    "cast_info": {"role_id": "eq"},
    "movie_companies": {"company_type_id": "eq"},
    "movie_info": {"info_group": "eq"},
    "movie_info_idx": {"info_group": "eq"},
}

#: A numeric column per table usable in a MIN() output aggregate.
MIN_COL: dict[str, str] = {
    "title": "production_year",
    "name": "id",
    "char_name": "id",
    "keyword": "id",
    "company_name": "id",
    "cast_info": "id",
    "movie_keyword": "id",
    "movie_companies": "id",
    "movie_info": "id",
    "movie_info_idx": "id",
    "info_type": "id",
    "kind_type": "id",
    "role_type": "id",
    "company_type": "id",
}


def n_rows(table: str, sf: float) -> int:
    """Row count of ``table`` at scale factor ``sf``."""
    if table in FIXED_SIZES:
        return FIXED_SIZES[table]
    return max(1, int(SIZES_SF1[table] * sf))
