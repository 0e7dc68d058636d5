"""Maximum-weight bipartite matching: the Hungarian algorithm with the
Lemma-8 label-sum early-termination hook, and greedy matching (LB)."""
