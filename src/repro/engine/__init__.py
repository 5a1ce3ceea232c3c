"""Vertex-centric async-accumulative engine: algorithms, local kernel, Spark loop."""
from repro.engine.algorithms import ALGORITHMS, Algorithm, bfs, pagerank, php, sssp  # noqa: F401
