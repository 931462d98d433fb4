"""Graph-stream substrate: synthetic generators, dataset registry, and
exact (non-sampled) triangle analytics used as ground truth.
"""
