"""DuckDB-oracle checks: every Spark binding table equals the result of an
independently written SQL query (recursive CTEs for temporal navigation)
over the point-exploded tables — via ``repro.oracle.assert_equivalent``."""
import pytest

from repro.trpq import queries as Q
from repro.trpq.match import eval_match_interval, eval_match_point, out_columns
from repro.trpq.oracle_sql import ORACLE_SQL, check_against_oracle


@pytest.mark.parametrize("name", sorted(ORACLE_SQL))
def test_interval_backend_vs_duckdb_fig1(name, fig1_data, fig1_interval_ev):
    q = Q.query(name)
    df = eval_match_interval(fig1_interval_ev, q).points().select(*out_columns(q))
    check_against_oracle(df, fig1_data, name)


@pytest.mark.parametrize("name", sorted(ORACLE_SQL))
def test_point_backend_vs_duckdb_fig1(name, fig1_data, fig1_point_ev):
    q = Q.query(name)
    df = eval_match_point(fig1_point_ev, q)
    check_against_oracle(df, fig1_data, name)


@pytest.mark.parametrize("name", sorted(ORACLE_SQL))
def test_interval_backend_vs_duckdb_generated(name, gen_data, gen_interval_ev):
    """Same oracle on a generated contact-tracing graph (richer shapes)."""
    q = Q.query(name)
    df = eval_match_interval(gen_interval_ev, q).points().select(*out_columns(q))
    check_against_oracle(df, gen_data, name)
