"""Tokenizer for the openCypher fragment (DESIGN.md §5).

Produces a flat token list for the recursive-descent parser. Keywords are
case-insensitive (normalised to upper case); identifiers keep their case.
Multi-character operators (``->``, ``<-``, ``<=``, ``>=``, ``<>``, ``..``)
are single tokens.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

KEYWORDS = {
    "MATCH",
    "WHERE",
    "RETURN",
    "DISTINCT",
    "AND",
    "OR",
    "NOT",
    "EXISTS",
    "AS",
    "UNWIND",
    "NODES",
    # recognised-but-rejected constructs — lexed as keywords so the parser
    # can produce a precise "outside the fragment" error:
    "ORDER",
    "BY",
    "SKIP",
    "LIMIT",
    "OPTIONAL",
    "WITH",
    "CREATE",
    "DELETE",
    "SET",
    "MERGE",
}

_PUNCT2 = ["->", "<-", "<=", ">=", "<>", ".."]
_PUNCT1 = list("()[]{}:,.*=<>-")


class CypherSyntaxError(ValueError):
    """Lexical or syntactic error in the query text."""


@dataclass(frozen=True)
class Token:
    kind: str  # 'KW' | 'IDENT' | 'INT' | 'FLOAT' | 'STRING' | 'PUNCT' | 'EOF'
    value: str
    pos: int


def tokenize(text: str) -> List[Token]:
    """Lex ``text`` into tokens; raises :class:`CypherSyntaxError` on junk."""
    out: List[Token] = []
    i, n = 0, len(text)
    while i < n:
        c = text[i]
        if c.isspace():
            i += 1
            continue
        if text[i : i + 2] == "//":
            while i < n and text[i] != "\n":
                i += 1
            continue
        two = text[i : i + 2]
        if two in _PUNCT2:
            out.append(Token("PUNCT", two, i))
            i += 2
            continue
        if c in "'\"":
            j = i + 1
            buf = []
            while j < n and text[j] != c:
                if text[j] == "\\" and j + 1 < n:
                    buf.append(text[j + 1])
                    j += 2
                else:
                    buf.append(text[j])
                    j += 1
            if j >= n:
                raise CypherSyntaxError(f"unterminated string literal at {i}")
            out.append(Token("STRING", "".join(buf), i))
            i = j + 1
            continue
        if c.isdigit():
            j = i
            while j < n and text[j].isdigit():
                j += 1
            # a '..' range must not swallow the first dot of '1..3'
            if j < n and text[j] == "." and text[j : j + 2] != ".." and j + 1 < n and text[j + 1].isdigit():
                j += 1
                while j < n and text[j].isdigit():
                    j += 1
                out.append(Token("FLOAT", text[i:j], i))
            else:
                out.append(Token("INT", text[i:j], i))
            i = j
            continue
        if c.isalpha() or c == "_":
            j = i
            while j < n and (text[j].isalnum() or text[j] == "_"):
                j += 1
            word = text[i:j]
            if word.upper() in KEYWORDS:
                out.append(Token("KW", word.upper(), i))
            else:
                out.append(Token("IDENT", word, i))
            i = j
            continue
        if c in _PUNCT1:
            out.append(Token("PUNCT", c, i))
            i += 1
            continue
        raise CypherSyntaxError(f"unexpected character {c!r} at position {i}")
    out.append(Token("EOF", "", n))
    return out
