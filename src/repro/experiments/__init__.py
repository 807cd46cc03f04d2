"""Table-reproduction harnesses (paper §7; one module per table)."""
