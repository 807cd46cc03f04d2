"""Graphsurge core: view-collection pipeline, ordering, splitting, executor."""
