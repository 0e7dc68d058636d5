"""Reproduction of Koios: Top-k Semantic Overlap Set Search (ICDE 2023).

Layout:
  ``semsim``    — element-similarity substrate: synthetic embeddings
                  (FastText substitute), similarity functions, the exact
                  top-similarity token index (Faiss substitute), the token
                  stream ``I_e`` and inverted index ``I_s``.
  ``matching``  — max-weight bipartite matching: Hungarian algorithm with
                  feasible-label-sum early termination, greedy matching.
  ``core``      — the Koios kernel (refinement + post-processing filters),
                  baselines, vanilla-overlap search, and the PySpark
                  distributed search / DataFrame pipeline.
  ``datasets``  — synthetic collections shaped like the paper's DBLP,
                  OpenData, Twitter and WDC datasets, plus query benchmarks.
  ``fuzzy``     — simplified SilkMoth-style fuzzy-search comparator.
"""
