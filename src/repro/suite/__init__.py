"""Experiment suite: parameter grids (Table II), the exhaustive runner
(Figure 1's methods × parameters × dataset-pairs execution), and the
aggregations behind the paper's tables and figures."""
from repro.suite.grids import method_grids, grid_size
from repro.suite.runner import ExperimentRecord, run_experiments, best_per_pair
from repro.suite.aggregate import min_median_max

__all__ = [
    "method_grids",
    "grid_size",
    "ExperimentRecord",
    "run_experiments",
    "best_per_pair",
    "min_median_max",
]
