"""TIL tokenizer tests."""
import pytest

from repro.til.lexer import LexError, Token, tokenize


def kinds(src):
    return [t.kind for t in tokenize(src)][:-1]  # drop eof


def texts(src):
    return [t.text for t in tokenize(src)][:-1]


class TestTokens:
    def test_identifiers_and_numbers(self):
        assert kinds("foo Bar _x 12 3.5") == ["ident"] * 3 + ["number"] * 2

    def test_punctuation(self):
        assert texts("{ } ( ) < > : ; , = . [ ]") == list("{}()<>:;,=.[]")

    def test_path_separator_is_one_token(self):
        assert kinds("a::b") == ["ident", "::", "ident"]
        assert texts("a::b") == ["a", "::", "b"]

    def test_connection_is_one_token(self):
        assert kinds("a -- b") == ["ident", "--", "ident"]

    def test_string(self):
        toks = tokenize('"./path/to/directory"')
        assert toks[0].kind == "string"
        assert toks[0].text == "./path/to/directory"

    def test_domain(self):
        toks = tokenize("'fast")
        assert toks[0].kind == "domain"
        assert toks[0].text == "fast"

    def test_comment_dropped(self):
        assert kinds("a // comment here\nb") == ["ident", "ident"]

    def test_documentation_kept(self):
        # Documentation is distinct from comments: it is an IR property.
        toks = tokenize("#this is port\ndocumentation#")
        assert toks[0].kind == "doc"
        assert toks[0].text == "this is port\ndocumentation"

    def test_line_and_column_tracking(self):
        toks = tokenize("a\n  b")
        assert (toks[0].line, toks[0].col) == (1, 1)
        assert (toks[1].line, toks[1].col) == (2, 3)

    def test_unknown_character(self):
        with pytest.raises(LexError):
            tokenize("a @ b")

    def test_eof_token(self):
        assert tokenize("")[-1].kind == "eof"

    def test_number_forms(self):
        assert texts("128.0 1 0.5") == ["128.0", "1", "0.5"]
