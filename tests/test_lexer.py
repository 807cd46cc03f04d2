"""GVDL lexer tests."""
import pytest

from repro.gvdl.lexer import LexError, Token, tokenize


def kinds(text):
    return [t.kind for t in tokenize(text)]


def values(text):
    return [t.value for t in tokenize(text)[:-1]]


def test_empty():
    assert tokenize("") == [Token("EOF", "", 0)]


def test_keywords_case_insensitive():
    assert values("CREATE View wHeRe") == ["create", "view", "where"]
    assert kinds("CREATE View wHeRe") == ["KW", "KW", "KW", "EOF"]


def test_identifier_keeps_case():
    toks = tokenize("MyView")
    assert toks[0].kind == "IDENT" and toks[0].value == "MyView"


def test_qualified_ident_lexes_as_three_tokens():
    assert values("src.city") == ["src", ".", "city"]


def test_integer_and_float():
    assert values("42 4.5") == [42, 4.5]
    assert kinds("42 4.5") == ["NUM", "NUM", "EOF"]


def test_negative_number():
    assert values("-7") == [-7]


def test_string_literal():
    assert values("'CA'") == ["CA"]
    assert kinds("'CA'") == ["STR", "EOF"]


def test_unterminated_string():
    with pytest.raises(LexError):
        tokenize("'oops")


def test_comparison_symbols():
    assert values("= != < <= > >=") == ["=", "!=", "<", "<=", ">", ">="]


def test_not_equal_alias():
    assert values("<>") == ["!="]


def test_unicode_leq_geq():
    assert values("duration ≤ 5 and year ≥ 2010") == [
        "duration", "<=", 5, "and", "year", ">=", 2010,
    ]


def test_brackets_and_punct():
    assert values("[ ] ( ) : , *") == ["[", "]", "(", ")", ":", ",", "*"]


def test_bad_character():
    with pytest.raises(LexError):
        tokenize("a @ b")


def test_positions_monotonic():
    toks = tokenize("create view v on g")
    assert [t.pos for t in toks] == sorted(t.pos for t in toks)


def test_booleans_are_keywords():
    assert kinds("true false") == ["KW", "KW", "EOF"]


def test_dash_in_identifier():
    # Paper's Listing 3 uses names like D1-Y2010.
    toks = tokenize("D1-Y2010")
    assert toks[0].kind == "IDENT" and toks[0].value == "D1-Y2010"


def test_full_statement_token_stream():
    text = "create view v on Calls edges where src.state = 'CA' and duration > 10"
    ks = kinds(text)
    assert ks[:5] == ["KW", "KW", "IDENT", "KW", "IDENT"]
    assert ks[-1] == "EOF"


def test_underscore_identifier():
    assert tokenize("_x1")[0].value == "_x1"
