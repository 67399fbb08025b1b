"""Graph substrate: distributed (Spark DataFrame) + sequential mirrors."""
from .graph import Graph
from .local import LocalGraph

__all__ = ["Graph", "LocalGraph"]
