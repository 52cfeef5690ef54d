"""The Modularis sub-operators (Section 3.3 of the paper).

Four categories:

* orchestration — ``ParameterLookup``, ``NestedMap``
* data processing — ``Map``, ``ParametrizedMap``, ``Projection``,
  ``CartesianProduct``, ``Filter``, ``Reduce``, ``ReduceByKey``, ``Zip``,
  ``LocalHistogram``, ``BuildProbe``
* network — ``MpiExecutor``, ``MpiHistogram``, ``MpiExchange``,
  ``MpiBroadcast``
* materialize & scan — ``LocalPartitioning``, ``RowScan``,
  ``MaterializeRowVector``

Every operator implements row-at-a-time semantics (``rows``) and/or a
vectorized batch path (``batches``); network operators are batch-only and
require an MPI-style communicator in the execution context.
"""
from repro.core.ops.base import ExecContext, SubOperator  # noqa: F401
from repro.core.ops.orchestration import NestedMap, ParameterLookup  # noqa: F401
from repro.core.ops.processing import (  # noqa: F401
    BuildProbe,
    CartesianProduct,
    Filter,
    LocalHistogram,
    Map,
    ParametrizedMap,
    Projection,
    Reduce,
    ReduceByKey,
    Zip,
)
from repro.core.ops.network import (  # noqa: F401
    MpiBroadcast,
    MpiExchange,
    MpiExecutor,
    MpiHistogram,
)
from repro.core.ops.matscan import (  # noqa: F401
    LocalPartitioning,
    MaterializeRowVector,
    RowScan,
)
