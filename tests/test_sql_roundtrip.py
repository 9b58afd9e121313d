"""Property tests: generated predicates survive the SQL round trip —
Expr.to_sql() parsed back by our SQL parser and evaluated identically
by DuckDB and Spark."""
import duckdb
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.analyzer.sql_parser import parse_inference_query
from repro.ir import And, Catalog, Cmp, Col, Filter, Lit, Not, Or, walk

COLS = ["a", "b", "c"]
OPS = ["<", "<=", ">", ">=", "=", "!="]


def exprs(depth=2):
    leaf = st.builds(
        Cmp,
        st.sampled_from(OPS),
        st.sampled_from([Col(c) for c in COLS]),
        st.builds(Lit, st.integers(-5, 5)),
    )
    return st.recursive(
        leaf,
        lambda inner: st.one_of(
            st.builds(lambda l, r: And([l, r]), inner, inner),
            st.builds(Or, inner, inner),
            st.builds(Not, inner),
        ),
        max_leaves=6,
    )


@pytest.fixture(scope="module")
def data():
    rng = np.random.default_rng(0)
    return pd.DataFrame({c: rng.integers(-6, 7, 200) for c in COLS})


@settings(max_examples=40, deadline=None)
@given(exprs())
def test_duckdb_roundtrip_via_parser(e):
    """to_sql → tokenizer/parser → to_sql must be evaluation-stable."""
    rng = np.random.default_rng(1)
    pdf = pd.DataFrame({c: rng.integers(-6, 7, 100) for c in COLS})
    catalog = Catalog().add_table("t", COLS)
    plan = parse_inference_query(f"SELECT a FROM t WHERE {e.to_sql()}", catalog, {})
    f = plan.child
    assert isinstance(f, Filter)
    con = duckdb.connect()
    con.register("t", pdf)
    orig = con.execute(f"SELECT a FROM t WHERE {e.to_sql()}").fetchdf()
    reparsed = con.execute(f"SELECT a FROM t WHERE {f.predicate.to_sql()}").fetchdf()
    con.close()
    pd.testing.assert_frame_equal(
        orig.sort_values("a").reset_index(drop=True),
        reparsed.sort_values("a").reset_index(drop=True),
    )


@settings(max_examples=15, deadline=None)
@given(exprs())
def test_generated_sql_is_valid_duckdb(e):
    """Every generated predicate must be executable SQL."""
    rng = np.random.default_rng(2)
    pdf = pd.DataFrame({c: rng.integers(-6, 7, 100) for c in COLS})
    con = duckdb.connect()
    con.register("t", pdf)
    got = con.execute(f"SELECT count(*) AS n FROM t WHERE {e.to_sql()}").fetchone()[0]
    con.close()
    assert 0 <= got <= len(pdf)


class TestParserEdgeCases:
    @pytest.fixture(scope="class")
    def catalog(self):
        return Catalog().add_table("t", COLS)

    @pytest.mark.parametrize(
        "sql",
        [
            "SELECT a FROM t WHERE a = -3",
            "SELECT a FROM t WHERE a >= 2 AND b < 4 AND c != 0",
            "SELECT a FROM t WHERE NOT (a = 1 OR b = 2)",
            "SELECT a, b AS bee FROM t",
            "SELECT * FROM t WHERE a <> 1",
        ],
    )
    def test_parses(self, catalog, sql):
        assert parse_inference_query(sql, catalog, {}) is not None

    @pytest.mark.parametrize(
        "sql",
        [
            "SELECT FROM t",
            "SELECT a FROM t WHERE",
            "SELECT a FROM t WHERE a >",
            "SELECT a FROM t WHERE a ~ 1",
            "SELECT a t",
        ],
    )
    def test_rejects(self, catalog, sql):
        with pytest.raises((SyntaxError, KeyError)):
            parse_inference_query(sql, catalog, {})

    def test_string_escape_roundtrip(self, catalog):
        plan = parse_inference_query(
            "SELECT a FROM t WHERE a = 'O''Hare'", catalog, {}
        )
        assert plan.child.predicate.right.value == "O'Hare"
