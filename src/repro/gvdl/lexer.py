"""Tokenizer for GVDL.

Produces a flat list of :class:`Token`. Keywords are case-insensitive;
identifiers keep their case. ``src.city`` lexes as IDENT DOT IDENT. The
unicode ``≤`` / ``≥`` comparison glyphs used in the paper's listings are
accepted as aliases for ``<=`` / ``>=``.
"""
from __future__ import annotations

from dataclasses import dataclass

KEYWORDS = {
    "create", "view", "collection", "aggregate", "on", "edges", "nodes",
    "where", "and", "or", "not", "group", "by", "as", "true", "false",
}

SYMBOLS = ["<=", ">=", "!=", "<>", "=", "<", ">", "(", ")", "[", "]", ":", ",", ".", "*"]
_UNICODE_ALIASES = {"≤": "<=", "≥": ">="}


@dataclass(frozen=True)
class Token:
    """One lexical token: ``kind`` ∈ {KW, IDENT, NUM, STR, SYM, EOF}."""

    kind: str
    value: str | int | float
    pos: int


class LexError(ValueError):
    """Raised on an unrecognized character or unterminated string."""


def tokenize(text: str) -> list[Token]:
    """Tokenize ``text`` into a list of tokens ending with an EOF token."""
    out: list[Token] = []
    i, n = 0, len(text)
    while i < n:
        c = text[i]
        if c.isspace():
            i += 1
            continue
        if c in _UNICODE_ALIASES:
            out.append(Token("SYM", _UNICODE_ALIASES[c], i))
            i += 1
            continue
        if c == "'":
            j = text.find("'", i + 1)
            if j < 0:
                raise LexError(f"unterminated string at {i}")
            out.append(Token("STR", text[i + 1 : j], i))
            i = j + 1
            continue
        if c.isdigit() or (c == "-" and i + 1 < n and text[i + 1].isdigit()):
            j = i + 1
            while j < n and (text[j].isdigit() or text[j] == "."):
                j += 1
            raw = text[i:j]
            out.append(
                Token("NUM", float(raw) if "." in raw else int(raw), i)
            )
            i = j
            continue
        if c.isalpha() or c == "_":
            j = i + 1
            while j < n and (text[j].isalnum() or text[j] in "_-"):
                j += 1
            raw = text[i:j]
            low = raw.lower()
            if low in KEYWORDS:
                out.append(Token("KW", low, i))
            else:
                out.append(Token("IDENT", raw, i))
            i = j
            continue
        matched = False
        for s in SYMBOLS:
            if text.startswith(s, i):
                out.append(Token("SYM", "!=" if s == "<>" else s, i))
                i += len(s)
                matched = True
                break
        if not matched:
            raise LexError(f"unexpected character {c!r} at {i}")
    out.append(Token("EOF", "", n))
    return out
