"""Compile GVDL predicate ASTs to PySpark ``Column``s and to DuckDB SQL.

The edge-view frame (from :meth:`repro.storage.GraphStore.edge_view_frame`)
exposes edge properties bare and endpoint node properties prefixed
``src_`` / ``dst_``; the compiler maps ``src.city`` → column ``src_city``.

Compiling the *same* AST to DuckDB SQL lets the oracle re-evaluate every
predicate over the same inputs, so a miscompiled predicate is caught by
``assert_equivalent`` rather than silently producing a wrong view.
"""
from __future__ import annotations

from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.gvdl.parser import BinOp, Expr, Ident, Lit, Not

_CMP_SPARK = {
    "=": lambda a, b: a == b,
    "!=": lambda a, b: a != b,
    "<": lambda a, b: a < b,
    "<=": lambda a, b: a <= b,
    ">": lambda a, b: a > b,
    ">=": lambda a, b: a >= b,
}


def ident_column(ident: Ident) -> str:
    """Physical column name for a property reference."""
    if ident.qualifier is None:
        return ident.name
    return f"{ident.qualifier}_{ident.name}"


def to_spark_column(expr: Expr) -> Column:
    """Compile a predicate AST to a PySpark boolean ``Column``."""
    if isinstance(expr, Lit):
        return F.lit(expr.value)
    if isinstance(expr, Ident):
        return F.col(ident_column(expr))
    if isinstance(expr, Not):
        return ~to_spark_column(expr.operand)
    if isinstance(expr, BinOp):
        if expr.op == "and":
            return to_spark_column(expr.left) & to_spark_column(expr.right)
        if expr.op == "or":
            return to_spark_column(expr.left) | to_spark_column(expr.right)
        return _CMP_SPARK[expr.op](
            to_spark_column(expr.left), to_spark_column(expr.right)
        )
    raise TypeError(f"unknown AST node {expr!r}")


def _sql_lit(v: object) -> str:
    if isinstance(v, bool):
        return "TRUE" if v else "FALSE"
    if isinstance(v, str):
        return "'" + v.replace("'", "''") + "'"
    return repr(v)


def to_sql(expr: Expr) -> str:
    """Compile a predicate AST to a DuckDB/ANSI SQL boolean expression
    over the same ``src_*`` / ``dst_*`` / edge-property column names."""
    if isinstance(expr, Lit):
        return _sql_lit(expr.value)
    if isinstance(expr, Ident):
        return ident_column(expr)
    if isinstance(expr, Not):
        return f"(NOT {to_sql(expr.operand)})"
    if isinstance(expr, BinOp):
        op = {"and": "AND", "or": "OR"}.get(expr.op, expr.op)
        return f"({to_sql(expr.left)} {op} {to_sql(expr.right)})"
    raise TypeError(f"unknown AST node {expr!r}")
