"""Tensor Query Processor (TQP) — the paper's core contribution.

Pipeline (§4): a frontend builds an IR graph (:mod:`repro.core.ir`,
:mod:`repro.frontends.builder`); canonicalization/optimization rules
rewrite it (:mod:`repro.core.rules`); the planning layer maps every IR
operator to a tensor-program implementation
(:mod:`repro.core.planner`, :mod:`repro.core.operators`); the execution
layer runs the plan topologically with tensor garbage collection
(:mod:`repro.core.executor`).  Relational data is held in columnar
tensor tables (:mod:`repro.core.schema`, :mod:`repro.core.convert`).
"""
# NOTE: import from the submodules directly (repro.core.compiler etc.);
# re-exporting here would create an import cycle with repro.frontends.
