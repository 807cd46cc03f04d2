"""Recursive-descent parser for GVDL → AST.

Grammar (keywords case-insensitive)::

    stmt        := filtered_view | view_collection | aggregate_view
    filtered_view   := CREATE VIEW name ON source EDGES WHERE pred
    view_collection := CREATE VIEW COLLECTION name ON source
                         '[' name ':' pred ']' (',' '[' name ':' pred ']')*
    aggregate_view  := CREATE AGGREGATE VIEW name ON source
                         NODES [WHERE pred] GROUP BY ident (',' ident)*
                               [AGGREGATE agg (',' agg)*]
                         [EDGES AGGREGATE agg (',' agg)*]
    agg   := ident '(' ('*' | ident) ')' [AS ident]
    pred  := or_expr
    or_expr  := and_expr (OR and_expr)*
    and_expr := unary (AND unary)*
    unary    := NOT unary | '(' pred ')' | cmp
    cmp      := operand (('='|'!='|'<'|'<='|'>'|'>=') operand)?
    operand  := [src|dst '.'] ident | NUM | STR | TRUE | FALSE

Predicates reference edge properties bare (``duration``) and endpoint node
properties qualified (``src.city`` / ``dst.state``), per paper §3.1.1.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Union

from repro.gvdl.lexer import Token, tokenize

# ---------------------------------------------------------------- AST nodes


@dataclass(frozen=True)
class Lit:
    """A literal: int, float, str or bool."""

    value: Union[int, float, str, bool]


@dataclass(frozen=True)
class Ident:
    """A property reference; ``qualifier`` is None (edge), 'src' or 'dst'."""

    qualifier: str | None
    name: str


@dataclass(frozen=True)
class BinOp:
    """Binary operation: comparison ('=', '!=', '<', '<=', '>', '>=')
    or boolean connective ('and', 'or')."""

    op: str
    left: "Expr"
    right: "Expr"


@dataclass(frozen=True)
class Not:
    """Boolean negation."""

    operand: "Expr"


Expr = Union[Lit, Ident, BinOp, Not]


@dataclass(frozen=True)
class AggItem:
    """One aggregate: ``func(arg) as alias``; arg '*' means count(*)."""

    func: str
    arg: str  # '*' or property name
    alias: str


@dataclass(frozen=True)
class FilteredViewDef:
    """``create view name on source edges where pred`` (paper Listing 1)."""

    name: str
    source: str
    predicate: Expr


@dataclass(frozen=True)
class ViewCollectionDef:
    """``create view collection ...`` (paper Listing 3)."""

    name: str
    source: str
    views: tuple[tuple[str, Expr], ...]


@dataclass(frozen=True)
class AggregateViewDef:
    """``create aggregate view ...`` (paper Listing 4, §6)."""

    name: str
    source: str
    node_where: Expr | None
    group_by: tuple[str, ...]
    node_aggs: tuple[AggItem, ...] = field(default_factory=tuple)
    edge_aggs: tuple[AggItem, ...] = field(default_factory=tuple)


Stmt = Union[FilteredViewDef, ViewCollectionDef, AggregateViewDef]


class ParseError(ValueError):
    """Raised on a syntax error, with token position."""


class _Parser:
    def __init__(self, tokens: list[Token]):
        self.toks = tokens
        self.i = 0

    # -- token helpers ------------------------------------------------
    def peek(self) -> Token:
        return self.toks[self.i]

    def next(self) -> Token:
        t = self.toks[self.i]
        self.i += 1
        return t

    def expect_kw(self, kw: str) -> None:
        t = self.next()
        if t.kind != "KW" or t.value != kw:
            raise ParseError(f"expected keyword {kw!r}, got {t.value!r} at {t.pos}")

    def expect_sym(self, sym: str) -> None:
        t = self.next()
        if t.kind != "SYM" or t.value != sym:
            raise ParseError(f"expected {sym!r}, got {t.value!r} at {t.pos}")

    def accept_sym(self, sym: str) -> bool:
        t = self.peek()
        if t.kind == "SYM" and t.value == sym:
            self.i += 1
            return True
        return False

    def accept_kw(self, kw: str) -> bool:
        t = self.peek()
        if t.kind == "KW" and t.value == kw:
            self.i += 1
            return True
        return False

    def ident(self) -> str:
        t = self.next()
        if t.kind != "IDENT":
            raise ParseError(f"expected identifier, got {t.value!r} at {t.pos}")
        return str(t.value)

    # -- statements ---------------------------------------------------
    def stmt(self) -> Stmt:
        self.expect_kw("create")
        if self.accept_kw("aggregate"):
            self.expect_kw("view")
            return self.aggregate_view()
        self.expect_kw("view")
        if self.accept_kw("collection"):
            return self.view_collection()
        return self.filtered_view()

    def filtered_view(self) -> FilteredViewDef:
        name = self.ident()
        self.expect_kw("on")
        source = self.ident()
        self.expect_kw("edges")
        self.expect_kw("where")
        return FilteredViewDef(name, source, self.pred())

    def view_collection(self) -> ViewCollectionDef:
        name = self.ident()
        self.expect_kw("on")
        source = self.ident()
        views: list[tuple[str, Expr]] = []
        while True:
            self.expect_sym("[")
            vname = self.ident()
            self.expect_sym(":")
            p = self.pred()
            self.expect_sym("]")
            views.append((vname, p))
            if not self.accept_sym(","):
                break
        if not views:
            raise ParseError("view collection needs at least one view")
        return ViewCollectionDef(name, source, tuple(views))

    def aggregate_view(self) -> AggregateViewDef:
        name = self.ident()
        self.expect_kw("on")
        source = self.ident()
        self.expect_kw("nodes")
        node_where = self.pred() if self.accept_kw("where") else None
        self.expect_kw("group")
        self.expect_kw("by")
        group_by = [self.ident()]
        while self.accept_sym(","):
            group_by.append(self.ident())
        node_aggs: list[AggItem] = []
        if self.accept_kw("aggregate"):
            node_aggs = self.agg_list()
        edge_aggs: list[AggItem] = []
        if self.accept_kw("edges"):
            self.expect_kw("aggregate")
            edge_aggs = self.agg_list()
        return AggregateViewDef(
            name, source, node_where, tuple(group_by),
            tuple(node_aggs), tuple(edge_aggs),
        )

    def agg_list(self) -> list[AggItem]:
        items = [self.agg_item()]
        while True:
            # An "edges" keyword after a comma-free list ends node aggs.
            t = self.peek()
            if t.kind == "SYM" and t.value == ",":
                self.i += 1
                items.append(self.agg_item())
            else:
                break
        return items

    def agg_item(self) -> AggItem:
        func = self.ident().lower()
        if func not in {"count", "sum", "min", "max", "avg"}:
            raise ParseError(f"unknown aggregate function {func!r}")
        self.expect_sym("(")
        if self.accept_sym("*"):
            arg = "*"
        else:
            arg = self.ident()
        self.expect_sym(")")
        if self.accept_kw("as"):
            alias = self.ident()
        else:
            alias = f"{func}_{'star' if arg == '*' else arg}"
        return AggItem(func, arg, alias)

    # -- predicates ---------------------------------------------------
    def pred(self) -> Expr:
        return self.or_expr()

    def or_expr(self) -> Expr:
        e = self.and_expr()
        while self.accept_kw("or"):
            e = BinOp("or", e, self.and_expr())
        return e

    def and_expr(self) -> Expr:
        e = self.unary()
        while self.accept_kw("and"):
            e = BinOp("and", e, self.unary())
        return e

    def unary(self) -> Expr:
        if self.accept_kw("not"):
            return Not(self.unary())
        if self.accept_sym("("):
            e = self.pred()
            self.expect_sym(")")
            return e
        return self.cmp()

    def cmp(self) -> Expr:
        left = self.operand()
        t = self.peek()
        if t.kind == "SYM" and t.value in {"=", "!=", "<", "<=", ">", ">="}:
            self.i += 1
            right = self.operand()
            return BinOp(str(t.value), left, right)
        return left  # bare boolean operand

    def operand(self) -> Expr:
        t = self.next()
        if t.kind == "NUM":
            return Lit(t.value)
        if t.kind == "STR":
            return Lit(str(t.value))
        if t.kind == "KW" and t.value in {"true", "false"}:
            return Lit(t.value == "true")
        if t.kind == "IDENT":
            name = str(t.value)
            if name in ("src", "dst") and self.accept_sym("."):
                return Ident(name, self.ident())
            return Ident(None, name)
        raise ParseError(f"unexpected token {t.value!r} at {t.pos}")


def parse(text: str) -> Stmt:
    """Parse a single GVDL statement."""
    p = _Parser(tokenize(text))
    s = p.stmt()
    t = p.peek()
    if t.kind != "EOF":
        raise ParseError(f"trailing input at {t.pos}: {t.value!r}")
    return s


def parse_predicate(text: str) -> Expr:
    """Parse a bare predicate expression (used by programmatic collections)."""
    p = _Parser(tokenize(text))
    e = p.pred()
    t = p.peek()
    if t.kind != "EOF":
        raise ParseError(f"trailing input at {t.pos}: {t.value!r}")
    return e
