"""The paper's contribution: EBBkC / VBBkC branch-and-bound kernels,
early-termination procedures (kC2Plex / kCtPlex), the distributed
edge-parallel engine, and a pure-DataFrame iterative-join lister.
"""
