"""Per-table reproduction harnesses (paper Tables 1–6)."""
