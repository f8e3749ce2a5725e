"""The five evaluated applications (paper §4.1) as engine-agnostic AppSpecs.

min/max family (start late): SSSP, ConnectedComponents, WidestPath.
arithmetic family (finish early): PageRank, TunkRank.
"""

from repro.apps.cc import CC
from repro.apps.pagerank import PR
from repro.apps.sssp import SSSP
from repro.apps.tunkrank import TR
from repro.apps.wp import WP

#: evaluation order of the paper's Table 5
APPS = {"SSSP": SSSP, "CC": CC, "WP": WP, "PR": PR, "TR": TR}

__all__ = ["APPS", "SSSP", "CC", "WP", "PR", "TR"]
