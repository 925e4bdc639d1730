"""EmbDI optimisations: alignment, merging, numeric, missing data (paper §5)."""
