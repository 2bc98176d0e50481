"""Property-based tests (hypothesis) for the pure substrates."""
import string

import duckdb
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import sql_emit
from repro.core.counts import apply_mapping, remove_values
from repro.llm import knowledge as kb

settings.register_profile("repro", max_examples=50, deadline=None)
settings.load_profile("repro")

words = st.text(alphabet=string.ascii_letters + string.digits + " .%/-:'",
                min_size=0, max_size=20)
idents = st.from_regex(r"[a-z_][a-z0-9_]{0,10}", fullmatch=True)


@given(words, words)
def test_edit_distance_symmetric(a, b):
    assert kb.edit_distance(a, b, cap=5) == kb.edit_distance(b, a, cap=5)


@given(words)
def test_edit_distance_identity(a):
    assert kb.edit_distance(a, a) == 0


@given(words, words)
def test_edit_distance_bounded_by_cap(a, b):
    assert kb.edit_distance(a, b, cap=3) <= 3


@given(words, words)
def test_digit_only_diff_symmetric(a, b):
    assert kb.digit_only_diff(a, b) == kb.digit_only_diff(b, a)


@given(words)
def test_digit_only_diff_irreflexive(a):
    assert not kb.digit_only_diff(a, a)


@given(words)
def test_shape_regex_matches_its_value(v):
    import re
    assert re.fullmatch(kb.shape_to_regex(kb.shape_of(v))[1:-1], v)


@given(words)
def test_sql_str_roundtrips_through_duckdb(v):
    con = duckdb.connect()
    try:
        out = con.execute(f"SELECT {sql_emit.sql_str(v)} AS v").fetchone()[0]
    finally:
        con.close()
    assert out == v


@given(st.lists(st.tuples(words, st.integers(1, 100)), max_size=20),
       st.dictionaries(words, words, max_size=5))
def test_apply_mapping_preserves_mass(counts, mapping):
    uniq: dict[str, int] = {}
    for v, c in counts:
        uniq[v] = uniq.get(v, 0) + c
    counts_t = tuple(uniq.items())
    out = apply_mapping(counts_t, mapping)
    assert sum(c for _, c in out) == sum(c for _, c in counts_t)


@given(st.lists(st.tuples(words, st.integers(1, 100)), max_size=20))
def test_remove_values_subset(counts):
    uniq = tuple({v: c for v, c in counts}.items())
    vals = [v for v, _ in uniq[:2]]
    out = remove_values(uniq, vals)
    assert all(v not in vals for v, _ in out)


@given(idents, st.dictionaries(words, words, min_size=1, max_size=8))
def test_mapping_case_emits_valid_duckdb_sql(col, mapping):
    expr = sql_emit.mapping_case(col, mapping)
    con = duckdb.connect()
    try:
        con.execute(f"SELECT {expr} AS out FROM "
                    f"(SELECT 'probe' AS {col})")
    finally:
        con.close()


@given(st.integers(0, 59), st.integers(0, 23))
def test_duration_grammar_roundtrip(m, h):
    total = h * 60 + m
    if total == 0:
        return
    rendered = (f"{h} hour {m} min" if h else f"{m} min")
    assert kb.parse_duration_minutes(rendered) == float(total)
