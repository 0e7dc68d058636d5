"""The Koios search engine: refinement/post-processing kernel with all
four filters, baselines, vanilla-overlap search, the distributed
partitioned search and the pure-DataFrame pipeline."""
