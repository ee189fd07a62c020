"""Analytics applications on top of the LMFAO engine (paper §2).

Each application reduces its data-intensive work to one batch of group-by
aggregates over the join: covar matrices (ridge linear regression), decision
trees (CART), mutual information (Chow-Liu structure learning), data cubes.
"""
