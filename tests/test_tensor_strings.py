"""Unit tests: char-matrix string tensor ops, incl. a LIKE reference model."""
import re

import numpy as np
import pytest
from hypothesis import given, strategies as st

from repro.tensor import strings

WORDS = ["", "a", "ab", "abc", "BRASS", "PROMO TIN", "MEDIUM POLISHED X",
         "special deposits requests", "forest green", "green forest"]


def test_encode_decode_roundtrip():
    mat = strings.encode(WORDS)
    np.testing.assert_array_equal(strings.decode(mat), np.array(WORDS, dtype=object))


def test_encode_shape_and_padding():
    mat = strings.encode(["ab", "a"])
    assert mat.shape == (2, 2)
    assert mat[1, 1] == 0  # right-padded with 0s (§4.1)


def test_lengths():
    mat = strings.encode(["", "xy", "abcd"])
    np.testing.assert_array_equal(strings.lengths(mat), [0, 2, 4])


def test_eq_const():
    mat = strings.encode(["aa", "ab", "aa"])
    np.testing.assert_array_equal(strings.eq_const(mat, "aa"), [True, False, True])
    # literal longer than any stored string
    np.testing.assert_array_equal(strings.eq_const(mat, "aaaa"), [False] * 3)


def test_eq_rows_mixed_width():
    a = strings.encode(["aa", "bb"])
    b = strings.encode(["aa", "bbb"])
    np.testing.assert_array_equal(strings.eq_rows(a, b), [True, False])


def test_isin():
    mat = strings.encode(["MAIL", "SHIP", "RAIL"])
    np.testing.assert_array_equal(
        strings.isin_consts(mat, ["MAIL", "SHIP"]), [True, True, False]
    )


def test_codes_preserve_lex_order():
    vals = ["pear", "apple", "banana", "apple"]
    codes = strings.codes(strings.encode(vals))
    order = np.argsort(codes, kind="stable")
    assert [vals[i] for i in order] == ["apple", "apple", "banana", "pear"]


def test_substring():
    mat = strings.encode(["13-555-1234", "31-444-0000"])
    np.testing.assert_array_equal(
        strings.decode(strings.substring(mat, 1, 2)), np.array(["13", "31"], dtype=object)
    )


def _like_ref(s: str, pattern: str) -> bool:
    regex = "^" + re.escape(pattern).replace("%", ".*") + "$"
    return re.match(regex, s, re.S) is not None


LIKE_CASES = [
    ("%BRASS", ["LARGE BRASS", "BRASS TIN", "BRASS"]),
    ("PROMO%", ["PROMO TIN", "XPROMO", "PROMO"]),
    ("MEDIUM POLISHED%", ["MEDIUM POLISHED TIN", "MEDIUM PLATED TIN"]),
    ("%special%requests%", [
        "ironic special the requests", "special requests",
        "requests special", "specialrequests", "special", "x requests special y",
    ]),
    ("%green%", ["forest green", "green", "greenish", "gren"]),
    ("%a%b%", ["ab", "ba", "xaybz", "b a b"]),
    ("a%a", ["aa", "a", "aba", "abab", "ba"]),
    ("%", ["", "anything"]),
]


@pytest.mark.parametrize("pattern,values", LIKE_CASES)
def test_like_matches_reference(pattern, values):
    mat = strings.encode(values)
    got = strings.like(mat, pattern)
    exp = [_like_ref(v, pattern) for v in values]
    np.testing.assert_array_equal(got, exp, err_msg=f"pattern={pattern}")


@given(
    st.lists(st.text(alphabet="abcx ", max_size=8), min_size=1, max_size=20),
    st.lists(st.sampled_from(["a", "b", "cx", "%"]), min_size=1, max_size=5),
)
def test_like_property(values, pattern_parts):
    pattern = "".join(pattern_parts)
    mat = strings.encode(values)
    got = strings.like(mat, pattern)
    exp = [_like_ref(v, pattern) for v in values]
    np.testing.assert_array_equal(got, exp, err_msg=f"pattern={pattern!r} values={values!r}")


def test_like_underscore_unsupported():
    with pytest.raises(NotImplementedError):
        strings.like(strings.encode(["x"]), "a_c")
