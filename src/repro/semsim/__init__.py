"""Element-similarity substrate: synthetic embeddings (FastText
substitute), similarity functions, the exact top-similarity token index
(Faiss substitute), the token stream ``I_e`` and inverted index ``I_s``."""
