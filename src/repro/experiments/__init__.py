"""Table-reproduction harnesses (paper §7, Tables 2-8)."""
