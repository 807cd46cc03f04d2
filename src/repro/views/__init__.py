"""Aggregate views (Graph OLAP; paper §6)."""
from repro.views.aggregate import aggregate_view, aggregate_view_from_gvdl  # noqa: F401
