"""Tensor programs executed *inside* Spark executors, per partition.

The paper's TQP is single-node; §4.3/§6.3 list data-parallel execution
as future work.  This package provides that layer for the reproduction:
the same tensor kernels (bitmap filters, Algorithm 1/2 joins,
Algorithm 3 aggregation) run as Arrow-fed pandas UDFs inside Spark
executors —

- :func:`repro.sparkexec.partitioned.run_map_plan` — partition-local
  plans (filter/project pipelines) via ``mapInPandas``;
- :func:`repro.sparkexec.joins.tensor_join` — equi-joins via hash
  bucketing + ``cogroup().applyInPandas`` running Algorithm 1/2 per
  bucket (all join modes);
- :func:`repro.sparkexec.aggregates.tensor_aggregate` — partial
  per-partition tensor aggregation + tensor final merge.

Every entry point is DataFrame→DataFrame, so Catalyst still plans the
shuffles while TQP's tensor programs do the per-partition work.
"""
