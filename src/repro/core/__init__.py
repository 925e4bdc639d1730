"""EmbDI core: graph → sentences → embeddings (paper §4)."""
