"""GVDL — the Graphsurge View Definition Language (paper §3).

A small SQL-like declarative language for defining filtered views, view
collections and aggregate views over a property graph:

.. code-block:: sql

    create view CA_Long_Calls on Calls
      edges where src.state = 'CA' and dst.state = 'CA'
        and duration > 10 and year = 2019

    create view collection call_analysis on Calls
      [D1: duration <= 1 and year <= 2010],
      [D2: duration <= 2 and year <= 2010]

    create aggregate view city_calls on Calls
      nodes group by city aggregate count(*) as num_phones
      edges aggregate sum(duration) as total_duration

Pipeline: :mod:`.lexer` → :mod:`.parser` (AST) → :mod:`.compiler`
(PySpark ``Column`` *and* DuckDB SQL, so the oracle can re-check every
predicate).
"""
from repro.gvdl.parser import (  # noqa: F401
    AggItem,
    AggregateViewDef,
    BinOp,
    FilteredViewDef,
    Ident,
    Lit,
    Not,
    ViewCollectionDef,
    parse,
    parse_predicate,
)
from repro.gvdl.compiler import to_spark_column, to_sql  # noqa: F401
