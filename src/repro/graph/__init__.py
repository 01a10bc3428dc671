"""Bipartite-graph substrate: edge-DataFrame helpers and dataset generators."""
