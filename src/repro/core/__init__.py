"""TDmatch core: graph construction, expand/compress, walks, embeddings,
matching and evaluation metrics (the paper's contribution)."""
