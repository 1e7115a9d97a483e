"""Hand-optimized tensor programs (§6.6) against the DuckDB oracle."""
import pytest

from repro.oracle import assert_equivalent
from repro.tpch import datagen, handopt, sqls
from tests.helpers import to_spark

SF = 0.01


@pytest.fixture(scope="module")
def tpch():
    return datagen.tpch_tables(SF)


CASES = [
    (q, mode)
    for q in (1, 6, 9, 14)
    for mode in ("torch", "jit", "tvm")
    if handopt.HANDOPT[q][mode] is not None
]


@pytest.mark.parametrize("q,mode", CASES)
def test_handopt_matches_oracle(spark, tpch, q, mode):
    conv = handopt.convert_tables(tpch, q)
    result = handopt.HANDOPT[q][mode](conv)
    inputs = {name: tpch[name] for name in sqls.TABLES[q]}
    assert_equivalent(to_spark(spark, result), sqls.QUERIES[q], **inputs)


@pytest.mark.parametrize("q", [1, 6, 9, 14])
def test_handopt_agrees_with_generic_plan(tpch, q):
    """Hand-opt and compiler-generated plans compute identical answers."""
    from repro.core.compiler import compile_plan
    from repro.tpch import plans
    from tests.helpers import assert_frames_match

    generic = compile_plan(plans.PLANS[q](), "torch").run(tpch)
    manual = handopt.HANDOPT[q]["torch"](handopt.convert_tables(tpch, q))
    assert_frames_match(manual, generic)


def test_tvm_support_matrix_matches_paper():
    """Paper: TVM only supports Q6 and Q14."""
    assert handopt.HANDOPT[6]["tvm"] is not None
    assert handopt.HANDOPT[14]["tvm"] is not None
    assert handopt.HANDOPT[1]["tvm"] is None
    assert handopt.HANDOPT[9]["tvm"] is None
