"""Behavioural tests for the simulated LLM (one per §2.1 capability)."""
import pytest

from repro.llm import SimulatedLLM


@pytest.fixture()
def llm() -> SimulatedLLM:
    return SimulatedLLM()


# ---------------------------------------------------------------------------
# string outliers (§2.1.1)
# ---------------------------------------------------------------------------

LANG = [("eng", 464), ("English", 95), ("fre", 40), ("French", 8),
        ("ger", 30), ("chi", 20)]


def test_language_inconsistency_detected(llm):
    r = llm.review_string_outliers("article_language", LANG)
    assert r.unusual
    assert set(r.unusual_values) == {"English", "French"}


def test_language_mapping_to_most_common_representation(llm):
    # the paper's Example 1: "English" -> "eng" because "eng" dominates
    m = llm.map_string_outliers("article_language", ["English", "French"], LANG)
    assert m.mapping == {"English": "eng", "French": "fre"}


def test_language_mapping_reverses_when_names_dominate(llm):
    values = [("English", 400), ("eng", 20), ("French", 100)]
    m = llm.map_string_outliers("language", ["eng"], values)
    assert m.mapping == {"eng": "English"}


def test_consistent_language_column_untouched(llm):
    r = llm.review_string_outliers("lang", [("eng", 400), ("fre", 100),
                                            ("ger", 50)])
    assert not r.unusual


def test_frequency_typo_detected_and_mapped(llm):
    values = [("Birmingham", 120), ("Boston", 80), ("Birminghxm", 1)]
    r = llm.review_string_outliers("city", values)
    assert r.unusual_values == ("Birminghxm",)
    m = llm.map_string_outliers("city", ["Birminghxm"], values)
    assert m.mapping == {"Birminghxm": "Birmingham"}


def test_rare_but_valid_city_not_a_typo(llm):
    # "Boaz" is a real city; no frequent value is within edit budget
    values = [("Birmingham", 300), ("Boaz", 2)]
    assert not llm.review_string_outliers("city", values).unusual


def test_numeric_neighbours_not_typos(llm):
    values = [("113 patients", 40), ("111 patients", 1), ("44 patients", 3)]
    assert not llm.review_string_outliers("sample", values).unusual


def test_volume_unit_inconsistency(llm):
    values = [("12.0 oz", 900), ("12.0 ounce", 40), ("16.0 oz", 200),
              ("12 oz", 25)]
    m = llm.map_string_outliers(
        "ounces", ["12.0 ounce", "12 oz"], values)
    assert m.mapping == {"12.0 ounce": "12.0 oz", "12 oz": "12.0 oz"}


def test_volume_units_never_cross_quantities(llm):
    values = [("12.0 oz", 900), ("16.0 oz", 10)]
    assert not llm.review_string_outliers("ounces", values).unusual


def test_dictionary_typo_fixed(llm):
    values = [("Randomizzed controlled trial", 1), ("Placebo cohort", 1)]
    m = llm.map_string_outliers(
        "title", ["Randomizzed controlled trial"], values)
    assert m.mapping == {
        "Randomizzed controlled trial": "Randomized controlled trial"}


def test_boolean_and_dmv_tokens_not_string_outliers(llm):
    assert not llm.review_string_outliers(
        "flag", [("yes", 700), ("no", 280), ("N/A", 20)]).unusual


# ---------------------------------------------------------------------------
# patterns (§2.1.2)
# ---------------------------------------------------------------------------

def test_pattern_trailing_junk_normalized(llm):
    values = [("7:10 a.m.", 11), ("9:25 p.m.", 12), ("7:10 a.m.x", 1)]
    r = llm.review_patterns("sched_dep_time", values)
    assert r.inconsistent
    assert r.mapping == {"7:10 a.m.x": "7:10 a.m."}
    assert any(p.startswith("^") and p.endswith("$") for p in r.patterns)


def test_pattern_date_format_unified(llm):
    values = [("12/01/2011", 50), ("2011-12-02", 3)]
    r = llm.review_patterns("d", values)
    assert r.mapping == {"2011-12-02": "12/02/2011"}


def test_pattern_date_format_unified_to_iso(llm):
    values = [("2011-12-02", 50), ("12/01/2011", 3)]
    r = llm.review_patterns("d", values)
    assert r.mapping == {"12/01/2011": "2011-12-01"}


def test_pattern_consistent_column(llm):
    r = llm.review_patterns("zip", [("35233", 10), ("10001", 5)])
    assert not r.inconsistent


def test_pattern_multiword_values_not_truncated(llm):
    # stripping letters off "Kansas City" must not produce a "fix"
    r = llm.review_patterns("city", [("Boston", 50), ("Kansas City", 3)])
    assert "Kansas City" not in r.mapping


# ---------------------------------------------------------------------------
# DMV (§2.1.3)
# ---------------------------------------------------------------------------

def test_dmv_detected(llm):
    r = llm.review_dmv("county", [("Jefferson", 700), ("N/A", 30),
                                  ("--", 3), ("unknown", 5)])
    assert set(r.dmv_values) == {"N/A", "--", "unknown"}


def test_dmv_clean_column(llm):
    assert not llm.review_dmv("city", [("Boston", 10)]).dmv_values


# ---------------------------------------------------------------------------
# column types (§2.1.4)
# ---------------------------------------------------------------------------

def test_type_boolean(llm):
    t = llm.suggest_type("emergency_service", "VARCHAR",
                         [("yes", 660), ("no", 340)])
    assert t.target_type == "BOOLEAN"
    assert t.mapping == {"yes": "True", "no": "False"}


def test_type_duration(llm):
    t = llm.suggest_type("duration", "VARCHAR",
                         [("100 min", 50), ("1 hour 40 min", 5)])
    assert t.target_type == "DOUBLE"
    assert t.mapping == {"100 min": "100.0", "1 hour 40 min": "100.0"}


def test_type_percent(llm):
    t = llm.suggest_type("score", "VARCHAR", [("85%", 20), ("90%", 10)])
    assert t.mapping == {"85%": "85.0", "90%": "90.0"}


def test_type_rating(llm):
    t = llm.suggest_type("rating_value", "VARCHAR", [("7.8/10", 9)])
    assert t.mapping == {"7.8/10": "7.8"}


def test_type_counts_with_nouns(llm):
    t = llm.suggest_type("sample", "VARCHAR", [("91 patients", 4)])
    assert t.mapping == {"91 patients": "91.0"}


def test_type_identifierish_columns_stay_varchar(llm):
    for col in ("zip", "provider_id", "phone", "measure_code",
                "journal_issn"):
        t = llm.suggest_type(col, "VARCHAR", [("07001", 3), ("35233", 5)])
        assert t.target_type == "VARCHAR" and not t.mapping


def test_type_leading_zero_digits_stay_varchar(llm):
    t = llm.suggest_type("account", "VARCHAR", [("07001", 3), ("35233", 5)])
    assert t.target_type == "VARCHAR"


def test_type_plain_integers_identity(llm):
    t = llm.suggest_type("ibu", "VARCHAR", [("45", 10), ("102", 3)])
    assert t.target_type == "INTEGER" and not t.mapping


def test_type_volume_keeps_unit_text(llm):
    t = llm.suggest_type("ounces", "VARCHAR", [("12.0 oz", 100)])
    assert t.target_type == "VARCHAR" and not t.mapping


def test_type_iso_dates(llm):
    t = llm.suggest_type("created", "VARCHAR", [("2011-12-01", 5)])
    assert t.target_type == "DATE" and not t.mapping


def test_type_dmv_values_ignored(llm):
    t = llm.suggest_type("duration", "VARCHAR",
                         [("90 min", 50), ("N/A", 5)])
    assert t.target_type == "DOUBLE"
    assert "N/A" not in t.mapping


# ---------------------------------------------------------------------------
# numeric ranges (§2.1.5)
# ---------------------------------------------------------------------------

@pytest.mark.parametrize("col,lo,hi", [
    ("score", 0.0, 100.0), ("abv", 0.0, 20.0), ("rating_value", 0.0, 10.0),
    ("year", 1880.0, 2035.0), ("duration", 0.0, 1000.0),
])
def test_numeric_ranges(llm, col, lo, hi):
    r = llm.review_numeric_range(col, 1.0, 2.0)
    assert r.has_range and (r.lo, r.hi) == (lo, hi)


def test_numeric_range_unknown_column(llm):
    assert not llm.review_numeric_range("stateavg", 0.0, 1.0).has_range


# ---------------------------------------------------------------------------
# FDs (§2.1.6)
# ---------------------------------------------------------------------------

@pytest.mark.parametrize("lhs,rhs", [
    ("zip", "city"), ("zip", "state"), ("measure_code", "measure_name"),
    ("brewery_id", "city"), ("provider_id", "hospital_name"),
    ("flight", "act_arr_time"), ("journal_issn", "journal_abbreviation"),
])
def test_meaningful_fds(llm, lhs, rhs):
    assert llm.review_fd(lhs, rhs, 0.1).meaningful


@pytest.mark.parametrize("lhs,rhs", [
    ("city", "zip"), ("phone", "emergency_service"),
    ("condition", "measure_code"), ("score", "sample"),
    ("hospital_name", "provider_id"),
])
def test_non_meaningful_fds(llm, lhs, rhs):
    assert not llm.review_fd(lhs, rhs, 0.01).meaningful


def test_fd_repair_confident_majority(llm):
    groups = {"35233": [("Birmingham", 16), ("Tucson", 2)]}
    r = llm.repair_fd("zip", "city", groups)
    assert r.mapping == {"35233": "Birmingham"} and not r.abstained


def test_fd_repair_absorbs_letter_typos(llm):
    groups = {"35233": [("Birmingham", 9), ("Birminghxm", 5)]}
    r = llm.repair_fd("zip", "city", groups)
    assert r.mapping == {"35233": "Birmingham"}


def test_fd_repair_abstains_on_ambiguous_times(llm):
    # the paper's AA-1733-ORD-PHX example: 5/4/3/1 conflicting times
    groups = {"AA-1733-ORD-PHX": [("10:30 p.m.", 5), ("10:31 p.m.", 4),
                                  ("10:28 p.m.", 3), ("10:39 p.m.", 1)]}
    r = llm.repair_fd("flight", "act_arr_time", groups)
    assert not r.mapping
    assert r.abstained == ("AA-1733-ORD-PHX",)


def test_fd_repair_mixed_groups(llm):
    groups = {
        "clear": [("9:00 a.m.", 9), ("9:05 a.m.", 2), ("9:07 a.m.", 1)],
        "murky": [("8:00 a.m.", 5), ("8:01 a.m.", 4), ("8:03 a.m.", 3)],
    }
    r = llm.repair_fd("flight", "act_dep_time", groups)
    assert r.mapping == {"clear": "9:00 a.m."}
    assert r.abstained == ("murky",)


# ---------------------------------------------------------------------------
# duplication / uniqueness / misplacement (§2.1.7-8, Table 2)
# ---------------------------------------------------------------------------

def test_duplication_erroneous_by_default(llm):
    assert not llm.review_duplication("hospital", 5, ["r1"]).acceptable


def test_duplication_acceptable_for_logs(llm):
    assert llm.review_duplication("sensor_log", 5, ["r1"]).acceptable


def test_uniqueness_key_column(llm):
    r = llm.review_uniqueness("order_id", 0.99, ["updated_time", "amount"])
    assert r.should_be_unique and r.order_by == "updated_time"


def test_uniqueness_non_key(llm):
    assert not llm.review_uniqueness("city", 0.99, ["zip"]).should_be_unique


def test_misplacement_confirmed_with_evidence(llm):
    r = llm.review_misplacement("language", "country", 80,
                                [("USA", "English")])
    assert r.swapped


def test_misplacement_rejected_without_evidence(llm):
    assert not llm.review_misplacement("language", "country", 1,
                                       [("USA", "English")]).swapped


def test_every_response_carries_prompt_and_reasoning(llm):
    r = llm.review_dmv("c", [("N/A", 1)])
    assert r.prompt and r.reasoning
    assert llm.calls > 0
