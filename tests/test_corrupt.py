"""Tests for the corruption operators (pure-function + property-based)."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.datasets import corrupt

WORDS = st.text(alphabet="abcdefghij ", min_size=0, max_size=40)


def g(seed=0):
    return np.random.default_rng(seed)


# --- determinism of every operator -----------------------------------------
@pytest.mark.parametrize(
    "op",
    [
        corrupt.typo_swap,
        corrupt.typo_delete,
        corrupt.typo_insert,
        corrupt.typo_replace,
        corrupt.drop_token,
        corrupt.swap_tokens,
        corrupt.abbreviate_token,
        corrupt.change_case,
    ],
)
def test_op_deterministic(op):
    assert op(g(7), "hello wonderful world") == op(g(7), "hello wonderful world")


# --- per-operator contracts -------------------------------------------------
def test_typo_swap_preserves_multiset():
    out = corrupt.typo_swap(g(1), "abcdef")
    assert sorted(out) == list("abcdef")
    assert len(out) == 6


def test_typo_delete_shortens_by_one():
    assert len(corrupt.typo_delete(g(1), "abcdef")) == 5


def test_typo_delete_short_string_unchanged():
    assert corrupt.typo_delete(g(1), "a") == "a"


def test_typo_insert_lengthens_by_one():
    assert len(corrupt.typo_insert(g(1), "abc")) == 4


def test_typo_replace_same_length():
    assert len(corrupt.typo_replace(g(1), "abcdef")) == 6


def test_typo_replace_empty_unchanged():
    assert corrupt.typo_replace(g(1), "") == ""


def test_drop_token_removes_one():
    out = corrupt.drop_token(g(1), "alpha beta gamma")
    assert len(out.split()) == 2
    assert set(out.split()) < {"alpha", "beta", "gamma"}


def test_drop_token_single_token_kept():
    assert corrupt.drop_token(g(1), "alpha") == "alpha"


def test_swap_tokens_preserves_tokens():
    out = corrupt.swap_tokens(g(1), "a b c d")
    assert sorted(out.split()) == ["a", "b", "c", "d"]
    assert out != "a b c d" or True  # adjacent swap may coincide only if equal tokens


def test_abbreviate_token_prefix():
    out = corrupt.abbreviate_token(g(3), "wonderful")
    assert "wonderful".startswith(out)


def test_change_case_casefold_equal():
    out = corrupt.change_case(g(1), "hello world")
    assert out.lower() == "hello world"


# --- corrupt_text ------------------------------------------------------------
def test_corrupt_text_level_zero_identity():
    assert corrupt.corrupt_text(g(1), "anything at all", 0.0) == "anything at all"


def test_corrupt_text_empty_identity():
    assert corrupt.corrupt_text(g(1), "", 3.0) == ""


def test_corrupt_text_deterministic():
    a = corrupt.corrupt_text(g(9), "the quick brown fox", 1.5)
    b = corrupt.corrupt_text(g(9), "the quick brown fox", 1.5)
    assert a == b


def test_corrupt_text_high_level_changes_most():
    changed = sum(
        corrupt.corrupt_text(g(i), "the quick brown fox jumps", 3.0)
        != "the quick brown fox jumps"
        for i in range(50)
    )
    assert changed > 40


@given(s=WORDS)
@settings(max_examples=60, deadline=None)
def test_corrupt_text_never_crashes_and_returns_str(s):
    out = corrupt.corrupt_text(np.random.default_rng(0), s, 2.0)
    assert isinstance(out, str)


@given(s=WORDS, seed=st.integers(0, 1000))
@settings(max_examples=60, deadline=None)
def test_all_ops_total_functions(s, seed):
    gg = np.random.default_rng(seed)
    for op in (
        corrupt.typo_swap, corrupt.typo_delete, corrupt.typo_insert,
        corrupt.typo_replace, corrupt.drop_token, corrupt.swap_tokens,
        corrupt.abbreviate_token, corrupt.change_case,
    ):
        assert isinstance(op(gg, s), str)


# --- jitter_number -----------------------------------------------------------
def test_jitter_number_close():
    out = corrupt.jitter_number(g(1), "12.3456", scale=0.001, decimals=4)
    assert abs(float(out) - 12.3456) < 0.01


def test_jitter_number_format():
    out = corrupt.jitter_number(g(1), "-3.5", scale=0.001, decimals=4)
    assert len(out.split(".")[1]) == 4


def test_jitter_number_non_numeric_unchanged():
    assert corrupt.jitter_number(g(1), "abc", scale=0.1, decimals=2) == "abc"
