"""Parser for the practical TRPQ syntax of Section IV.

Parses MATCH clauses such as::

    MATCH (x:Person {risk = 'high'})-
      /(FWD/:meets/FWD + FWD/:visits/FWD/:Room/BWD/:visits/BWD)
      /NEXT[0,12]/-({test = 'pos'})
    ON contact_tracing

into a chain of node/edge patterns connected by NavL[PC,NOI] path ASTs.
Per Section V-A's worked translations, practical operators are lowered to
the formal language with existence made explicit:

* ``NEXT``/``PREV``       → ``(N/∃)`` / ``(P/∃)`` (temporal steps land on
  existing objects — "all temporal objects must exist, as required in
  Section IV");
* ``NEXT[n,m]``, ``NEXT*`` → ``(N/∃)[n,m]``, ``(N/∃)[0,_]``;
* ``FWD``/``BWD``          → bare ``F`` / ``B`` (the neighbouring label or
  pattern test carries ∃, exactly as in the paper's Q8/Q12 translations);
* ``:label``               → ``(label ∧ ∃)``;
* ``{p = 'v'}``            → ``p↦v`` (σ defined implies ξ true);
* ``{time < 'k'}``         → ``<k``;  ``{time = 'k'}`` → ``(<k+1 ∧ ¬<k)``;
* a node pattern ``(x:L {...})`` → ``Node ∧ L ∧ ... ∧ ∃``; an edge pattern
  ``[z:L]`` → ``Edge ∧ L ∧ ∃``.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field
from typing import Optional

from . import ast

_TOKEN_RE = re.compile(
    r"\s+|(?P<str>'[^']*')|(?P<num>\d+)|(?P<id>[A-Za-z_][A-Za-z0-9_]*)"
    r"|(?P<sym>->|[(){}\[\],+*/<=:>\-_])"
)


class ParseError(ValueError):
    pass


def _tokenize(text: str) -> list[str]:
    toks, pos = [], 0
    while pos < len(text):
        m = _TOKEN_RE.match(text, pos)
        if not m:
            raise ParseError(f"cannot tokenize at: {text[pos:pos + 20]!r}")
        pos = m.end()
        if m.lastgroup:
            toks.append(m.group())
    return toks


@dataclass(frozen=True)
class Pattern:
    """A node or edge pattern in a MATCH chain: ``(x:Person {risk='high'})``
    or ``[z:meets]``. ``var`` is None for anonymous patterns."""

    var: Optional[str]
    kind: str  # 'node' | 'edge' | 'any'
    label: Optional[str]
    conds: tuple[tuple[str, str, str], ...]  # (name, op, value); name may be 'time'

    def test(self) -> ast.Test:
        parts: list[ast.Test] = []
        if self.kind == "node":
            parts.append(ast.NODE)
        elif self.kind == "edge":
            parts.append(ast.EDGE)
        if self.label:
            parts.append(ast.LabelTest(self.label))
        for name, op, value in self.conds:
            parts.append(_cond_test(name, op, value))
        parts.append(ast.EXISTS)
        return ast.conj(*parts)


@dataclass
class MatchQuery:
    """A parsed MATCH clause: alternating patterns and path links.

    ``elements`` has odd length: ``[Pattern, Path, Pattern, ...]``.
    """

    elements: list
    graph: str
    text: str = ""

    @property
    def patterns(self) -> list[Pattern]:
        return self.elements[0::2]

    @property
    def links(self) -> list[ast.Path]:
        return self.elements[1::2]

    @property
    def vars(self) -> list[str]:
        return [p.var for p in self.patterns if p.var]


def _cond_test(name: str, op: str, value: str) -> ast.Test:
    if name == "time":
        k = int(value)
        if op == "<":
            return ast.LtTest(k)
        if op == "=":
            return ast.AndTest(ast.LtTest(k + 1), ast.NotTest(ast.LtTest(k)))
        raise ParseError(f"unsupported time operator {op!r}")
    if op != "=":
        raise ParseError(f"unsupported property operator {op!r}")
    return ast.PropTest(name, value)


class _Parser:
    def __init__(self, toks: list[str]):
        self.toks = toks
        self.i = 0

    def peek(self, ahead: int = 0) -> Optional[str]:
        j = self.i + ahead
        return self.toks[j] if j < len(self.toks) else None

    def take(self, expected: Optional[str] = None) -> str:
        tok = self.peek()
        if tok is None:
            raise ParseError(f"unexpected end of input (wanted {expected!r})")
        if expected is not None and tok != expected:
            raise ParseError(f"expected {expected!r}, got {tok!r} at {self.i}")
        self.i += 1
        return tok

    # ----------------------------------------------------------- MATCH level
    def match_query(self, text: str) -> MatchQuery:
        self.take("MATCH")
        elements: list = [self.node_pattern()]
        while self.peek() == "-":
            self.take("-")
            if self.peek() == "[":
                mid = self.edge_pattern()
                elements += [ast.F, mid, ast.F]
                if self.peek() == "->":
                    self.take("->")
                else:
                    self.take("-")
                    self.take(">")
                elements.append(self.node_pattern())
            elif self.peek() == "/":
                self.take("/")
                path = self.union()
                self.take("/")
                self.take("-")
                elements.append(path)
                elements.append(self.node_pattern())
            elif self.peek() == "(":
                # plain structural adjacency "-(:Room)-" is not used bare in
                # the paper's MATCH chains; treat as error for clarity.
                raise ParseError("expected -[...]-> or -/.../- link")
            else:
                raise ParseError(f"unexpected token {self.peek()!r} after '-'")
        self.take("ON")
        graph = self.take()
        if self.peek() is not None:
            raise ParseError(f"trailing input: {self.toks[self.i:]}")
        return MatchQuery(elements=elements, graph=graph, text=text)

    def node_pattern(self) -> Pattern:
        self.take("(")
        var = label = None
        conds: tuple = ()
        if self.peek() not in (":", "{", ")") and re.match(r"[A-Za-z_]", self.peek() or ""):
            var = self.take()
        if self.peek() == ":":
            self.take(":")
            label = self.take()
        if self.peek() == "{":
            conds = self.cond_block()
        self.take(")")
        return Pattern(var=var, kind="node", label=label, conds=conds)

    def edge_pattern(self) -> Pattern:
        self.take("[")
        var = label = None
        if self.peek() not in (":", "]") and re.match(r"[A-Za-z_]", self.peek() or ""):
            var = self.take()
        if self.peek() == ":":
            self.take(":")
            label = self.take()
        self.take("]")
        return Pattern(var=var, kind="edge", label=label, conds=())

    def cond_block(self) -> tuple:
        self.take("{")
        conds = [self.cond()]
        while self.peek() == "AND":
            self.take("AND")
            conds.append(self.cond())
        self.take("}")
        return tuple(conds)

    def cond(self) -> tuple[str, str, str]:
        name = self.take()
        op = self.take()
        if op not in ("=", "<"):
            raise ParseError(f"bad comparison operator {op!r}")
        value = self.take()
        if not (value.startswith("'") and value.endswith("'")):
            raise ParseError(f"property values must be quoted, got {value!r}")
        if name != "time" and op != "=":
            raise ParseError(f"only '=' comparisons are supported for properties, got {op!r}")
        return (name, op, value[1:-1])

    # ------------------------------------------------------------ path level
    def union(self) -> ast.Path:
        parts = [self.concat()]
        while self.peek() == "+":
            self.take("+")
            parts.append(self.concat())
        return ast.union(*parts)

    def concat(self) -> ast.Path:
        parts = [self.postfix()]
        # a '/' followed by '-' closes the -/path/- link, so stop there.
        while self.peek() == "/" and self.peek(1) != "-":
            self.take("/")
            parts.append(self.postfix())
        return ast.seq(*parts)

    def postfix(self) -> ast.Path:
        p = self.atom()
        while self.peek() in ("[", "*"):
            if self.take() == "*":
                p = ast.Repeat(p, 0, None)
            else:
                lo = int(self.take())
                self.take(",")
                hi_tok = self.take()
                hi = None if hi_tok == "_" else int(hi_tok)
                self.take("]")
                p = ast.Repeat(p, lo, hi)
        return p

    def atom(self) -> ast.Path:
        tok = self.peek()
        if tok == "PREV":
            self.take()
            return ast.seq(ast.P, ast.EXISTS)
        if tok == "NEXT":
            self.take()
            return ast.seq(ast.N, ast.EXISTS)
        if tok == "FWD":
            self.take()
            return ast.F
        if tok == "BWD":
            self.take()
            return ast.B
        if tok == ":":
            self.take()
            return ast.TestExpr(ast.AndTest(ast.LabelTest(self.take()), ast.EXISTS))
        if tok == "{":
            conds = self.cond_block()
            return ast.TestExpr(ast.conj(*[_cond_test(*c) for c in conds]))
        if tok == "(":
            self.take("(")
            p = self.union()
            self.take(")")
            return p
        raise ParseError(f"unexpected token {tok!r} in path expression")


def parse_match(text: str) -> MatchQuery:
    """Parse a full MATCH clause into a :class:`MatchQuery`."""
    return _Parser(_tokenize(text)).match_query(text)


def parse_path(text: str) -> ast.Path:
    """Parse a bare ``-/.../-`` path body (without the surrounding ``-/ /-``)."""
    p = _Parser(_tokenize(text))
    out = p.union()
    if p.peek() is not None:
        raise ParseError(f"trailing input: {p.toks[p.i:]}")
    return out
