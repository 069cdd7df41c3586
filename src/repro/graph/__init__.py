"""Graph substrate for the EBBkC reproduction.

Everything the paper's algorithms stand on: edge-list normalization,
synthetic graph generators (stand-ins for the paper's 19 real graphs),
degeneracy / truss / coloring orderings, triangle dataflow, t-plex
helpers, maximum-clique search, and per-graph statistics (Table 1).
"""
