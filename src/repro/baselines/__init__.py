"""The paper's competitors (§2.3, §5.1), implemented from scratch."""
from repro.baselines.exact import exact_query
from repro.baselines.hay import hay_edge_er
from repro.baselines.mc import mc_er
from repro.baselines.mc2 import mc2_edge_er
from repro.baselines.rp import RPIndex
from repro.baselines.tp import tp_er
from repro.baselines.tpc import tpc_er

__all__ = [
    "exact_query",
    "hay_edge_er",
    "mc_er",
    "mc2_edge_er",
    "RPIndex",
    "tp_er",
    "tpc_er",
]
