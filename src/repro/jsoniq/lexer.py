"""Hand-written JSONiq tokenizer.

The paper generates its lexer with ANTLR v4 from the JSONiq grammar
(§5.2). ANTLR is unavailable offline and the parsing technology is not
part of the evaluated contribution, so we tokenize by hand (documented
in DESIGN.md §4). The token set covers the JSONiq subset used by every
query in the paper.

JSONiq names (NCNames) may contain ``-``, so ``json-file`` is a single
NAME token and subtraction must be written with whitespace (``$a - 1``),
exactly as in real JSONiq.
"""
from __future__ import annotations

from dataclasses import dataclass

from .errors import ParseError

# Words with reserved meaning *in the position where a keyword is
# expected*. The parser still accepts them as object keys / function
# names where the grammar allows it.
KEYWORDS = frozenset(
    {
        "for", "let", "where", "group", "by", "order", "return", "count",
        "in", "at", "allowing", "stable", "ascending", "descending",
        "empty", "greatest", "least", "if", "then", "else", "some",
        "every", "satisfies", "and", "or", "not", "to", "div", "idiv",
        "mod", "eq", "ne", "lt", "le", "gt", "ge", "true", "false",
        "null", "instance", "of", "treat", "as",
    }
)

# Multi-character punctuation must be matched before single characters.
# NOTE: "[[" / "]]" (array lookup) are intentionally NOT single tokens:
# they would collide with nested array constructors like [1, [2]]. The
# parser recognizes array lookup as two adjacent bracket tokens.
_PUNCT = [
    "||", ":=", "!=", "<=", ">=",
    "{", "}", "[", "]", "(", ")", ",", ":", ".", ";",
    "+", "-", "*", "=", "<", ">", "?", "!",
]


@dataclass(frozen=True)
class Token:
    """A single lexed token.

    ``kind`` is one of: NAME, KEYWORD, VAR (``$name``), CONTEXT (``$$``),
    STRING, INTEGER, DECIMAL, DOUBLE, a punctuation literal (e.g. ``:=``)
    or EOF. ``value`` carries the decoded payload (name without ``$``,
    unescaped string, numeric text).
    """

    kind: str
    value: str
    line: int
    column: int

    def __repr__(self) -> str:  # compact for parser error messages
        return f"{self.kind}({self.value!r})"


def _is_name_start(ch: str) -> bool:
    return ch.isalpha() or ch == "_"


def _is_name_char(ch: str) -> bool:
    return ch.isalnum() or ch in "_-"


def tokenize(text: str) -> list[Token]:
    """Tokenize ``text`` into a list of :class:`Token` ending with EOF.

    Raises :class:`ParseError` on unterminated strings, bad escapes or
    unexpected characters, with 1-based line/column positions.
    """
    tokens: list[Token] = []
    i, n = 0, len(text)
    line, col = 1, 1

    def advance(k: int) -> None:
        nonlocal i, line, col
        for _ in range(k):
            if i < n and text[i] == "\n":
                line += 1
                col = 1
            else:
                col += 1
            i += 1

    while i < n:
        ch = text[i]
        # -- whitespace ------------------------------------------------
        if ch.isspace():
            advance(1)
            continue
        # -- comments: (: ... :) nested, as in XQuery/JSONiq -----------
        if text.startswith("(:", i):
            depth, start_line, start_col = 0, line, col
            while i < n:
                if text.startswith("(:", i):
                    depth += 1
                    advance(2)
                elif text.startswith(":)", i):
                    depth -= 1
                    advance(2)
                    if depth == 0:
                        break
                else:
                    advance(1)
            if depth != 0:
                raise ParseError("unterminated comment", start_line, start_col)
            continue
        # -- variables and the context item ----------------------------
        if ch == "$":
            if text.startswith("$$", i):
                tokens.append(Token("CONTEXT", "$$", line, col))
                advance(2)
                continue
            j = i + 1
            if j >= n or not _is_name_start(text[j]):
                raise ParseError("expected variable name after '$'", line, col)
            k = j
            while k < n and _is_name_char(text[k]):
                k += 1
            tokens.append(Token("VAR", text[j:k], line, col))
            advance(k - i)
            continue
        # -- string literals (JSON escape rules) ------------------------
        if ch == '"':
            start_line, start_col = line, col
            j = i + 1
            out: list[str] = []
            while True:
                if j >= n:
                    raise ParseError("unterminated string literal", start_line, start_col)
                c = text[j]
                if c == '"':
                    j += 1
                    break
                if c == "\\":
                    if j + 1 >= n:
                        raise ParseError("unterminated escape", start_line, start_col)
                    e = text[j + 1]
                    mapping = {'"': '"', "\\": "\\", "/": "/", "b": "\b",
                               "f": "\f", "n": "\n", "r": "\r", "t": "\t"}
                    if e in mapping:
                        out.append(mapping[e])
                        j += 2
                    elif e == "u":
                        hex4 = text[j + 2 : j + 6]
                        if len(hex4) != 4:
                            raise ParseError("bad \\u escape", start_line, start_col)
                        try:
                            out.append(chr(int(hex4, 16)))
                        except ValueError as exc:
                            raise ParseError("bad \\u escape", start_line, start_col) from exc
                        j += 6
                    else:
                        raise ParseError(f"bad escape '\\{e}'", start_line, start_col)
                else:
                    out.append(c)
                    j += 1
            tokens.append(Token("STRING", "".join(out), start_line, start_col))
            advance(j - i)
            continue
        # -- numbers ----------------------------------------------------
        if ch.isdigit() or (ch == "." and i + 1 < n and text[i + 1].isdigit()):
            j = i
            while j < n and text[j].isdigit():
                j += 1
            kind = "INTEGER"
            if j < n and text[j] == "." and j + 1 < n and text[j + 1].isdigit():
                kind = "DECIMAL"
                j += 1
                while j < n and text[j].isdigit():
                    j += 1
            if j < n and text[j] in "eE":
                k = j + 1
                if k < n and text[k] in "+-":
                    k += 1
                if k < n and text[k].isdigit():
                    kind = "DOUBLE"
                    j = k
                    while j < n and text[j].isdigit():
                        j += 1
            tokens.append(Token(kind, text[i:j], line, col))
            advance(j - i)
            continue
        # -- names and keywords -----------------------------------------
        if _is_name_start(ch):
            j = i
            while j < n and _is_name_char(text[j]):
                j += 1
            word = text[i:j]
            kind = "KEYWORD" if word in KEYWORDS else "NAME"
            tokens.append(Token(kind, word, line, col))
            advance(j - i)
            continue
        # -- punctuation --------------------------------------------------
        for p in _PUNCT:
            if text.startswith(p, i):
                tokens.append(Token(p, p, line, col))
                advance(len(p))
                break
        else:
            raise ParseError(f"unexpected character {ch!r}", line, col)

    tokens.append(Token("EOF", "", line, col))
    return tokens
