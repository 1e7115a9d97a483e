"""Listing 1 vs Listing 2 (§3.1): both filter implementations agree."""
import numpy as np

from repro.tensor import tensor as tt


def _listing1(l_quantity: tt.Tensor) -> tt.Tensor:
    mask = tt.lt(l_quantity, 24)
    return tt.masked_select(l_quantity, mask)


def _listing2(l_quantity: tt.Tensor) -> tt.Tensor:
    output = tt.zeros_like(l_quantity)
    j = 0
    for i in range(len(l_quantity)):
        datum = l_quantity[i]
        if datum < 24:
            output[j] = datum
            j += 1
    return tt.Tensor(output.data[:j])


def test_listings_agree():
    g = np.random.default_rng(0)
    q = tt.Tensor(g.integers(1, 51, 500).astype(np.float64))
    np.testing.assert_array_equal(_listing1(q).numpy(), _listing2(q).numpy())


def test_wrapper_arith_and_compare():
    a = tt.Tensor(np.array([1.0, 2.0, 3.0]))
    b = tt.Tensor(np.array([3.0, 2.0, 1.0]))
    np.testing.assert_array_equal((a + b).numpy(), [4.0, 4.0, 4.0])
    np.testing.assert_array_equal((a - b).numpy(), [-2.0, 0.0, 2.0])
    np.testing.assert_array_equal((a * b).numpy(), [3.0, 4.0, 3.0])
    np.testing.assert_array_equal((a / b).numpy(), [1 / 3, 1.0, 3.0])
    np.testing.assert_array_equal((a < b).numpy(), [True, False, False])
    np.testing.assert_array_equal((a >= b).numpy(), [False, True, True])


def test_wrapper_metadata():
    a = tt.Tensor(np.zeros((4, 2)))
    assert a.shape == (4, 2)
    assert len(a) == 4
    assert a.dtype == np.float64
    assert a.sum() == 0.0


def test_item_and_scalar_access():
    a = tt.Tensor(np.array([42.0]))
    assert a.item() == 42.0
    assert a[0] == 42.0
