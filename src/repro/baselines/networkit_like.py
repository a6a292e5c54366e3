"""NetworKit PLM stand-in for the modularity comparison (Figure 17).

NetworKit's PLM is, like PAR-MOD, an asynchronous Louvain for
modularity; the paper attributes its ≤3.5x advantage over NetworKit
specifically to *parallelizing the graph compression step*. This
stand-in therefore runs the identical engine and objective but forces
compression through a single-threaded interpreted aggregation
(``compress_mode="driver_python"``), isolating exactly the difference
the paper measures. NetworKit's default iteration cap (num_iter=32) is
used, matching the paper's comparison setup.
"""
from __future__ import annotations

import numpy as np

from ..core.config import CCConfig
from ..core.par_louvain import parallel_cc
from ..core.state import RunStats
from ..graphs.ops import GraphData


def networkit_like(
    g: GraphData, *, gamma: float = 1.0, seed: int = 0, partitions: int = 8
) -> tuple[np.ndarray, RunStats]:
    """PLM stand-in: async parallel modularity Louvain, sequential compression."""
    cfg = CCConfig(
        resolution=gamma,
        objective="modularity",
        num_iter=32,
        async_moves=True,
        frontier="vertices",
        refine=True,
        seed=seed,
        partitions=partitions,
    )
    assign, stats = parallel_cc(g, cfg, compress_mode="driver_python")
    stats.algo = "networkit-like"
    return assign, stats
