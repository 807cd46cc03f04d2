"""Aggregate views (paper §6, Listing 4; Graph-OLAP [12, 35]).

An aggregate view groups nodes into super-nodes on a set of node
properties and aggregates the original edges into super-edges: edge (u, v)
contributes to the super-edge between u's and v's super-nodes. Nodes can be
pre-filtered with an optional ``where`` predicate (nodes failing it — and
their edges — are excluded from the summary).

Evaluated as plain Spark dataflows of join + aggregation operators, the
PySpark equivalent of the paper's TD aggregation dataflow.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.gvdl.compiler import to_spark_column
from repro.gvdl.parser import AggItem, AggregateViewDef, parse
from repro.storage.store import GraphStore

_AGG_FN = {"sum": F.sum, "min": F.min, "max": F.max, "avg": F.avg}


def _agg_cols(items: tuple[AggItem, ...]):
    out = []
    for it in items:
        if it.func == "count":
            col = F.count(F.lit(1)) if it.arg == "*" else F.count(F.col(it.arg))
        else:
            if it.arg == "*":
                raise ValueError(f"{it.func}(*) is not a valid aggregate")
            col = _AGG_FN[it.func](F.col(it.arg))
        out.append(col.alias(it.alias))
    return out


def aggregate_view(
    store: GraphStore, vdef: AggregateViewDef
) -> tuple[DataFrame, DataFrame]:
    """Evaluate an aggregate-view definition; returns
    ``(super_nodes, super_edges)``.

    ``super_nodes`` has the group-by properties plus the node aggregates
    (``count(*)`` always available via an explicit AggItem). ``super_edges``
    has ``src_<p>``/``dst_<p>`` group columns for every group-by property
    p, a ``num_edges`` count, plus the edge aggregates.
    """
    nodes = store.nodes_sdf
    if vdef.node_where is not None:
        # Node predicates may not reference src./dst. qualifiers.
        for part in _idents(vdef.node_where):
            if part.qualifier is not None:
                raise ValueError("node where-clause cannot use src./dst.")
        nodes = nodes.where(to_spark_column(vdef.node_where))
    gb = list(vdef.group_by)
    super_nodes = nodes.groupBy(*gb).agg(
        F.count(F.lit(1)).alias("num_nodes"), *_agg_cols(vdef.node_aggs)
    )

    membership = nodes.select("vid", *gb)
    s = membership.select(
        F.col("vid").alias("_svid"), *[F.col(p).alias(f"src_{p}") for p in gb]
    )
    d = membership.select(
        F.col("vid").alias("_dvid"), *[F.col(p).alias(f"dst_{p}") for p in gb]
    )
    e = store.edges_sdf
    joined = (
        e.join(s, e.src == s._svid)
        .join(d, e.dst == d._dvid)
        .drop("_svid", "_dvid")
    )
    keys = [f"src_{p}" for p in gb] + [f"dst_{p}" for p in gb]
    super_edges = joined.groupBy(*keys).agg(
        F.count(F.lit(1)).alias("num_edges"), *_agg_cols(vdef.edge_aggs)
    )
    return super_nodes, super_edges


def aggregate_view_from_gvdl(
    store: GraphStore, text: str
) -> tuple[DataFrame, DataFrame]:
    """Parse a ``create aggregate view`` statement and evaluate it."""
    stmt = parse(text)
    if not isinstance(stmt, AggregateViewDef):
        raise TypeError("expected a 'create aggregate view' statement")
    return aggregate_view(store, stmt)


def _idents(expr):
    """Yield every Ident in a predicate AST."""
    from repro.gvdl.parser import BinOp, Ident, Not

    if isinstance(expr, Ident):
        yield expr
    elif isinstance(expr, BinOp):
        yield from _idents(expr.left)
        yield from _idents(expr.right)
    elif isinstance(expr, Not):
        yield from _idents(expr.operand)
