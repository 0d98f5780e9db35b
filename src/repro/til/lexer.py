"""Tokenizer for TIL.

Token kinds: identifiers, numbers (integers and decimal rationals),
double-quoted strings (link paths), documentation blocks delimited by
``#`` signs (an IR property, not a comment — Section 7.2), domain names
(``'ident``), and punctuation including the multi-character ``::``
(path separator) and ``--`` (connection). ``//`` comments run to end of
line and are discarded.
"""
from __future__ import annotations

import re
from dataclasses import dataclass
from typing import Iterator, List

#: Multi-character punctuation must be matched before single characters.
_PUNCT = ("::", "--", "{", "}", "(", ")", "<", ">", ":", ";", ",", "=", ".", "[", "]")

_TOKEN_RE = re.compile(
    r"""
    (?P<ws>\s+)
  | (?P<comment>//[^\n]*)
  | (?P<doc>\#[^#]*\#)
  | (?P<string>"[^"]*")
  | (?P<number>\d+(?:\.\d+)?)
  | (?P<domain>'[a-zA-Z_][a-zA-Z0-9_]*)
  | (?P<ident>[a-zA-Z_][a-zA-Z0-9_]*)
  | (?P<punct>::|--|[{}()<>:;,=.\[\]])
    """,
    re.VERBOSE,
)


class LexError(ValueError):
    """Raised on characters TIL does not recognize."""


@dataclass(frozen=True)
class Token:
    kind: str  # "ident" | "number" | "string" | "doc" | "domain" | punctuation itself | "eof"
    text: str
    line: int
    col: int

    def __repr__(self) -> str:
        return f"{self.kind}({self.text!r}@{self.line}:{self.col})"


def tokenize(source: str) -> List[Token]:
    """Tokenize ``source``, dropping whitespace and ``//`` comments but
    keeping documentation blocks (they are IR properties)."""
    tokens: List[Token] = []
    pos, line, line_start = 0, 1, 0
    while pos < len(source):
        m = _TOKEN_RE.match(source, pos)
        if m is None:
            col = pos - line_start + 1
            raise LexError(f"unexpected character {source[pos]!r} at {line}:{col}")
        kind = m.lastgroup
        text = m.group()
        col = pos - line_start + 1
        if kind == "punct":
            tokens.append(Token(text, text, line, col))
        elif kind == "doc":
            tokens.append(Token("doc", text[1:-1].strip(), line, col))
        elif kind == "string":
            tokens.append(Token("string", text[1:-1], line, col))
        elif kind == "domain":
            tokens.append(Token("domain", text[1:], line, col))
        elif kind in ("ident", "number"):
            tokens.append(Token(kind, text, line, col))
        # ws / comment: dropped
        nl = text.count("\n")
        if nl:
            line += nl
            line_start = pos + text.rfind("\n") + 1
        pos = m.end()
    tokens.append(Token("eof", "", line, pos - line_start + 1))
    return tokens
