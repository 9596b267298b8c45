"""Graph data model: data graphs, pattern graphs, and update records."""
from repro.graphs.datagraph import DataGraph
from repro.graphs.pattern import STAR, PatternGraph
from repro.graphs.updates import Update, apply_updates_data, apply_updates_pattern

__all__ = [
    "DataGraph",
    "PatternGraph",
    "STAR",
    "Update",
    "apply_updates_data",
    "apply_updates_pattern",
]
