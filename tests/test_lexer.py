"""Lexer unit tests."""
import pytest

from repro.cypher.lexer import CypherSyntaxError, Token, tokenize


def kinds(text):
    return [(t.kind, t.value) for t in tokenize(text)[:-1]]  # drop EOF


def test_empty():
    assert tokenize("") == [Token("EOF", "", 0)]


def test_whitespace_only():
    assert kinds("   \n\t ") == []


@pytest.mark.parametrize(
    "kw", ["MATCH", "WHERE", "RETURN", "DISTINCT", "AND", "OR", "NOT", "EXISTS", "AS", "UNWIND"]
)
def test_keywords_upper(kw):
    assert kinds(kw) == [("KW", kw)]


@pytest.mark.parametrize("kw", ["match", "Match", "mAtCh"])
def test_keywords_case_insensitive(kw):
    assert kinds(kw) == [("KW", "MATCH")]


def test_identifier_keeps_case():
    assert kinds("FooBar") == [("IDENT", "FooBar")]


def test_identifier_with_underscore_and_digits():
    assert kinds("a_1b") == [("IDENT", "a_1b")]


def test_int():
    assert kinds("42") == [("INT", "42")]


def test_float():
    assert kinds("3.25") == [("FLOAT", "3.25")]


def test_int_followed_by_range():
    # '1..3' must lex as INT, .., INT — not FLOAT
    assert kinds("1..3") == [("INT", "1"), ("PUNCT", ".."), ("INT", "3")]


def test_single_quoted_string():
    assert kinds("'hello'") == [("STRING", "hello")]


def test_double_quoted_string():
    assert kinds('"hi there"') == [("STRING", "hi there")]


def test_string_with_escape():
    assert kinds(r"'it\'s'") == [("STRING", "it's")]


def test_unterminated_string():
    with pytest.raises(CypherSyntaxError, match="unterminated"):
        tokenize("'oops")


def test_arrows():
    assert kinds("-[]->") == [
        ("PUNCT", "-"),
        ("PUNCT", "["),
        ("PUNCT", "]"),
        ("PUNCT", "->"),
    ]


def test_left_arrow():
    assert kinds("<-[]-") == [
        ("PUNCT", "<-"),
        ("PUNCT", "["),
        ("PUNCT", "]"),
        ("PUNCT", "-"),
    ]


@pytest.mark.parametrize("op", ["<=", ">=", "<>", "=", "<", ">"])
def test_comparison_ops(op):
    assert kinds(op) == [("PUNCT", op)]


def test_comment_skipped():
    assert kinds("MATCH // a comment\n RETURN") == [("KW", "MATCH"), ("KW", "RETURN")]


def test_unexpected_character():
    with pytest.raises(CypherSyntaxError, match="unexpected character"):
        tokenize("MATCH @")


def test_positions_recorded():
    toks = tokenize("MATCH (n)")
    assert toks[0].pos == 0
    assert toks[1].pos == 6


def test_full_query_token_stream():
    toks = kinds("MATCH (p:Post)-[:REPLY*1..3]->(c) RETURN p")
    assert ("KW", "MATCH") in toks and ("PUNCT", "*") in toks and ("PUNCT", "..") in toks


def test_rejected_keywords_are_lexed_as_keywords():
    assert kinds("ORDER BY") == [("KW", "ORDER"), ("KW", "BY")]
