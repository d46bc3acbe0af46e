"""Unit tests for the JSONiq tokenizer."""
import pytest

from repro.jsoniq.errors import ParseError
from repro.jsoniq.lexer import Token, tokenize


def kinds(text):
    return [t.kind for t in tokenize(text)]


def values(text):
    return [t.value for t in tokenize(text)[:-1]]


class TestBasicTokens:
    def test_eof_only(self):
        assert kinds("") == ["EOF"]

    def test_whitespace_only(self):
        assert kinds("  \n\t ") == ["EOF"]

    def test_integer(self):
        toks = tokenize("42")
        assert toks[0] == Token("INTEGER", "42", 1, 1)

    def test_decimal(self):
        assert tokenize("3.14")[0].kind == "DECIMAL"

    def test_double(self):
        assert tokenize("1e10")[0].kind == "DOUBLE"
        assert tokenize("2.5E-3")[0].kind == "DOUBLE"

    def test_leading_dot_number(self):
        # ".5" after a digit context: the lexer supports .5 as DECIMAL
        assert tokenize(".5")[0].kind == "DECIMAL"

    def test_name(self):
        assert tokenize("foo")[0] == Token("NAME", "foo", 1, 1)

    def test_name_with_dash(self):
        toks = tokenize("json-file")
        assert toks[0] == Token("NAME", "json-file", 1, 1)
        assert toks[1].kind == "EOF"

    def test_keyword(self):
        assert tokenize("for")[0].kind == "KEYWORD"

    def test_variable(self):
        assert tokenize("$foo")[0] == Token("VAR", "foo", 1, 1)

    def test_variable_with_dash(self):
        assert tokenize("$a-b")[0].value == "a-b"

    def test_context_item(self):
        assert tokenize("$$")[0].kind == "CONTEXT"

    def test_subtraction_requires_space(self):
        # "$a-1" lexes the dash into the variable name, as in JSONiq.
        assert values("$a - 1") == ["a", "-", "1"]
        assert tokenize("$a-1")[0].value == "a-1"


class TestStrings:
    def test_simple(self):
        assert tokenize('"hello"')[0] == Token("STRING", "hello", 1, 1)

    def test_escapes(self):
        assert tokenize(r'"a\"b\\c\nd\te"')[0].value == 'a"b\\c\nd\te'

    def test_unicode_escape(self):
        assert tokenize(r'"é"')[0].value == "é"

    def test_unterminated(self):
        with pytest.raises(ParseError):
            tokenize('"abc')

    def test_bad_escape(self):
        with pytest.raises(ParseError):
            tokenize(r'"\x"')

    def test_bad_unicode_escape(self):
        with pytest.raises(ParseError):
            tokenize(r'"\uzzzz"')


class TestPunctuation:
    @pytest.mark.parametrize(
        "text,expected",
        [
            ("[[", ["[", "["]),  # not fused: see lexer._PUNCT note
            ("]]", ["]", "]"]),
            ("||", ["||"]),
            (":=", [":="]),
            ("[ [", ["[", "["]),
            ("{}", ["{", "}"]),
            ("()", ["(", ")"]),
            ("a.b", ["NAME", ".", "NAME"]),
        ],
    )
    def test_punct(self, text, expected):
        got = kinds(text)[:-1]
        want = [e if e not in ("NAME",) else "NAME" for e in expected]
        assert got == want

    def test_unexpected_char(self):
        with pytest.raises(ParseError):
            tokenize("§")


class TestComments:
    def test_simple_comment(self):
        assert kinds("1 (: hi :) 2") == ["INTEGER", "INTEGER", "EOF"]

    def test_nested_comment(self):
        assert kinds("(: a (: b :) c :) 1") == ["INTEGER", "EOF"]

    def test_unterminated_comment(self):
        with pytest.raises(ParseError):
            tokenize("(: open")


class TestPositions:
    def test_line_column(self):
        toks = tokenize("a\n  b")
        assert (toks[0].line, toks[0].column) == (1, 1)
        assert (toks[1].line, toks[1].column) == (2, 3)

    def test_error_position(self):
        with pytest.raises(ParseError) as e:
            tokenize("ok\n   §")
        assert e.value.line == 2

    def test_dollar_without_name(self):
        with pytest.raises(ParseError):
            tokenize("$ 1")
