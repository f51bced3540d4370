"""Core engine: graphs, operators, dynamic tiling, fusion, scheduling.

This package implements the paper's three computation graphs (tileable,
chunk, subtask), the yield-based dynamic tiling driver, the coloring
graph-level fusion, the band scheduler, and the executors.
"""
