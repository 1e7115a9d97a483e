"""Tensor-program implementations of relational operators (§5).

The planning layer (§4.2.4) maps each IR alias to one of these classes
via :data:`repro.core.planner.OPERATOR_IMPLS`.
"""
