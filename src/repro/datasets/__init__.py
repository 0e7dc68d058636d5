"""Synthetic collections shaped like the paper's DBLP, OpenData,
Twitter and WDC datasets, plus the per-cardinality query benchmarks."""
