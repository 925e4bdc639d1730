"""Data-integration tasks: SM / ER / TM and embedding-quality tests (paper §6–7)."""
