"""The prompt templates render the information the paper's figures show."""
from repro.llm import prompts


VALUES = [("eng", 464), ("English", 95)]


def test_string_outlier_detection_prompt():
    p = prompts.string_outlier_detection("article_language", VALUES)
    assert "article_language" in p
    assert "'eng' (x464)" in p
    assert "Inconsistent representations" in p
    assert "respond in json" in p.lower()


def test_string_outlier_detection_prompt_caps_sample():
    many = [(f"v{i}", 1) for i in range(2000)]
    p = prompts.string_outlier_detection("c", many)
    assert "v999" in p and "v1000" not in p  # 1000-value sample (paper)


def test_string_outlier_cleaning_prompt():
    p = prompts.string_outlier_cleaning("c", ["English"], VALUES)
    assert "English" in p and "Mapping" in p


def test_pattern_prompt():
    p = prompts.pattern_review("ship_date", [("99/99/9999", 900)])
    assert "99/99/9999" in p and "regular expression" in p


def test_dmv_prompt():
    p = prompts.dmv_review("county", [("N/A", 10)])
    assert "NULL" in p and "N/A" in p


def test_type_prompt():
    p = prompts.type_review("emergency", "VARCHAR", [("yes", 5), ("no", 5)])
    assert "VARCHAR" in p and "BOOLEAN" in p


def test_numeric_range_prompt():
    p = prompts.numeric_range_review("score", 55.0, 150.0)
    assert "55.0" in p and "150.0" in p


def test_fd_prompts():
    p = prompts.fd_review("zip", "city", 0.1234)
    assert "zip -> city" in p and "0.1234" in p
    q = prompts.fd_repair("zip", "city", {"35233": [("Birmingham", 17),
                                                    ("Tucson", 1)]})
    assert "'Birmingham' (x17)" in q and "abstain" in q


def test_duplication_prompt():
    p = prompts.duplication_review("logs", 12, ["row a", "row b"])
    assert "12" in p and "acceptable" in p


def test_uniqueness_prompt():
    p = prompts.uniqueness_review("order_id", 0.999, ["updated_at"])
    assert "0.9990" in p and "updated_at" in p


def test_misplacement_prompt():
    p = prompts.misplacement_review("language", "country", 80,
                                    [("USA", "English")])
    assert "language" in p and "80" in p and "USA" in p
