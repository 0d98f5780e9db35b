"""TIL — the Tydi Intermediate Language: grammar and parser (Section 7.2)."""

from .parser import ParseError, parse_project  # noqa: F401
