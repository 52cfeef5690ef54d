"""Monolithic baseline operators (Barthels et al. [5,6]).

The comparators of the paper's Section 5.1: the distributed radix hash
join and a distributed GROUP BY implemented as single hand-fused code
paths over the raw MPI/RDMA API — no sub-operator abstractions, numpy
kernels fused across phases. Used for the Fig. 6 performance-overhead
comparison and the Table 1 lines-of-code comparison.
"""
from repro.monolithic.join import run_monolithic_join  # noqa: F401
from repro.monolithic.groupby import run_monolithic_groupby  # noqa: F401
