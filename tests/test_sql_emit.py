"""SQL emission: portability rules, builders and layer rendering."""
import duckdb
import pandas as pd
import pytest

from repro.core import sql_emit
from repro.core.sql_emit import Layer, build_sql


# ---------------------------------------------------------------------------
# identifiers and literals
# ---------------------------------------------------------------------------

@pytest.mark.parametrize("name", ["city", "zip_code", "_x", "a1"])
def test_safe_ident_accepts(name):
    assert sql_emit.safe_ident(name) == name


@pytest.mark.parametrize("name", ["City", "1abc", "a-b", "a b", 'a"b', ""])
def test_safe_ident_rejects(name):
    with pytest.raises(ValueError):
        sql_emit.safe_ident(name)


def test_sql_str_escapes_quotes():
    assert sql_emit.sql_str("it's") == "'it''s'"


def test_sql_str_rejects_backslash():
    with pytest.raises(ValueError):
        sql_emit.sql_str("a\\b")


# ---------------------------------------------------------------------------
# expression builders (validated on DuckDB — same dialect Spark runs)
# ---------------------------------------------------------------------------

def _duck(expr_by_col: dict[str, str], pdf: pd.DataFrame) -> pd.DataFrame:
    con = duckdb.connect()
    con.register("t", pdf)
    sel = ", ".join(f"{e} AS {c}" for c, e in expr_by_col.items())
    try:
        return con.execute(f"SELECT {sel} FROM t").fetchdf()
    finally:
        con.close()


def test_mapping_case():
    expr = sql_emit.mapping_case("city", {"Birminghxm": "Birmingham"})
    out = _duck({"city": expr}, pd.DataFrame(
        {"city": ["Birminghxm", "Boston", None]}))
    assert list(out["city"]) == ["Birmingham", "Boston", None]


def test_null_case():
    expr = sql_emit.null_case("county", ["N/A", "--"])
    out = _duck({"county": expr}, pd.DataFrame(
        {"county": ["N/A", "Jefferson", "--"]}))
    assert list(out["county"]) == [None, "Jefferson", None]


def test_fd_repair_case_preserves_nulls():
    expr = sql_emit.fd_repair_case("zip", "city", {"35233": "Birmingham"})
    out = _duck({"city": expr}, pd.DataFrame({
        "zip": ["35233", "35233", "10001"],
        "city": ["Tucson", None, "NYC"],
    }))
    assert list(out["city"]) == ["Birmingham", None, "NYC"]


def test_swap_case():
    a_expr, b_expr = sql_emit.swap_case(
        "language", "country", ["USA"], ["English"])
    out = _duck({"language": a_expr, "country": b_expr}, pd.DataFrame({
        "language": ["USA", "English", "USA"],
        "country": ["English", "USA", "France"],
    }))
    # row 3: only one side misplaced-looking -> untouched
    assert list(out["language"]) == ["English", "English", "USA"]
    assert list(out["country"]) == ["USA", "USA", "France"]


# ---------------------------------------------------------------------------
# layers and the nested-CTE statement
# ---------------------------------------------------------------------------

def _toy() -> pd.DataFrame:
    return pd.DataFrame({
        "row_id": ["0", "1", "2", "3"],
        "a": ["x", "x", "y", "y"],
        "b": ["1", "1", "2", "3"],
    })


def test_build_sql_empty_layers_is_identity():
    sql = build_sql("t", [], ["row_id", "a", "b"])
    con = duckdb.connect()
    con.register("t", _toy())
    assert len(con.execute(sql).fetchdf()) == 4


def test_project_layer_passes_untouched_columns():
    layer = Layer("l1", exprs={"a": sql_emit.mapping_case("a", {"x": "z"})},
                  comments=["why"])
    sql = build_sql("t", [layer], ["row_id", "a", "b"])
    assert "-- why" in sql
    con = duckdb.connect()
    con.register("t", _toy())
    out = con.execute(sql).fetchdf()
    assert list(out["a"]) == ["z", "z", "y", "y"]
    assert list(out["b"]) == ["1", "1", "2", "3"]


def test_window_dedupe_layer_keeps_first_by_order():
    layer = Layer("dedupe", kind="window_dedupe",
                  key_cols=["a", "b"], order_col="row_id")
    sql = build_sql("t", [layer], ["row_id", "a", "b"])
    con = duckdb.connect()
    con.register("t", _toy())
    out = con.execute(sql).fetchdf().sort_values("row_id")
    assert list(out["row_id"]) == ["0", "2", "3"]


def test_window_dedupe_desc_order():
    layer = Layer("dedupe", kind="window_dedupe",
                  key_cols=["a"], order_col="b", order_desc=True)
    sql = build_sql("t", [layer], ["row_id", "a", "b"])
    assert "ORDER BY b DESC" in sql
    con = duckdb.connect()
    con.register("t", _toy())
    out = con.execute(sql).fetchdf().sort_values("row_id")
    # keeps the max-b row per a-group
    assert set(out["row_id"]) == {"0", "3"} or set(out["row_id"]) == {"1", "3"}


def test_layers_nest_in_order():
    l1 = Layer("s1", exprs={"a": sql_emit.mapping_case("a", {"x": "y"})})
    l2 = Layer("s2", exprs={"a": sql_emit.mapping_case("a", {"y": "w"})})
    sql = build_sql("t", [l1, l2], ["row_id", "a", "b"])
    con = duckdb.connect()
    con.register("t", _toy())
    out = con.execute(sql).fetchdf()
    assert set(out["a"]) == {"w"}  # x -> y -> w through both layers


def test_unknown_layer_kind_raises():
    with pytest.raises(ValueError):
        Layer("bad", kind="nope").render("t", ["a"])


def test_spark_and_duckdb_agree_on_emitted_sql(spark):
    """The same emitted SQL text must run identically on both engines."""
    from repro.benchdata.base import to_spark_strings
    from repro.oracle import assert_equivalent

    pdf = pd.DataFrame({
        "row_id": ["0", "1", "2"],
        "city": ["Birminghxm", "Boston", "N/A"],
        "note": ["it's fine", None, "x"],
    })
    layers = [
        Layer("fixes", exprs={
            "city": sql_emit.mapping_case("city", {"Birminghxm": "Birmingham"}),
        }),
        Layer("dmv", exprs={"city": sql_emit.null_case("city", ["N/A"])}),
    ]
    sql = build_sql("emit_check", layers, ["row_id", "city", "note"])
    sdf = to_spark_strings(spark, pdf)
    sdf.createOrReplaceTempView("emit_check")
    assert_equivalent(spark.sql(sql), sql, emit_check=pdf)
