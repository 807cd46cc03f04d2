"""Differential computation substrate (the paper's DD layer, on PySpark)."""
from repro.differential.engine import (  # noqa: F401
    AlgoSpec,
    RunResult,
    ViewEdges,
    run_view,
)
