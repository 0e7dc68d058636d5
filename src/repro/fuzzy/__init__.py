"""Fuzzy (syntactic) set-search comparator: a simplified SilkMoth-style
threshold search with the paper's top-k adaptation (§VIII-B)."""
