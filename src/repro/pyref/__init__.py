"""Pure-Python reference substrate (executable spec + local engine kernels)."""
from .local_graph import LocalMLGraph
from .kernels import dcc, dcore, layer_cores, refine_u, support, vertex_deletion
from .index import NumIndex

__all__ = [
    "LocalMLGraph",
    "NumIndex",
    "dcc",
    "dcore",
    "layer_cores",
    "refine_u",
    "support",
    "vertex_deletion",
]
