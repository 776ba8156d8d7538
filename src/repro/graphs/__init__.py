"""Graph substrate: generators, the evaluation suite, stats, ground truth."""
from repro.graphs.generators import Graph  # noqa: F401
