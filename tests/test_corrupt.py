"""Tests for repro.matchgen.corrupt — error injection primitives."""
import numpy as np
import pytest

from repro.matchgen import corrupt as C


@pytest.fixture
def rng():
    return np.random.default_rng(0)


class TestTypo:
    def test_changes_or_keeps_length_pm_one(self, rng):
        for _ in range(50):
            out = C.typo("keyboard", rng)
            assert abs(len(out) - len("keyboard")) <= 1

    def test_empty_string_unchanged(self, rng):
        assert C.typo("", rng) == ""

    def test_deterministic_in_seed(self):
        a = C.typo("hello world", np.random.default_rng(7))
        b = C.typo("hello world", np.random.default_rng(7))
        assert a == b


class TestDropToken:
    def test_removes_exactly_one_token(self, rng):
        out = C.drop_token("one two three", rng)
        assert len(out.split()) == 2

    def test_single_token_unchanged(self, rng):
        assert C.drop_token("single", rng) == "single"

    def test_remaining_tokens_from_original(self, rng):
        out = C.drop_token("a b c d", rng)
        assert set(out.split()) < {"a", "b", "c", "d"}


class TestSwapTokens:
    def test_preserves_token_multiset(self, rng):
        out = C.swap_tokens("a b c d", rng)
        assert sorted(out.split()) == ["a", "b", "c", "d"]

    def test_single_token_unchanged(self, rng):
        assert C.swap_tokens("only", rng) == "only"

    def test_adjacent_swap(self):
        rng = np.random.default_rng(0)
        for _ in range(30):
            out = C.swap_tokens("a b c", rng)
            assert out in {"b a c", "a c b", "a b c"}


class TestCaseNoise:
    def test_output_is_case_variant(self, rng):
        out = C.case_noise("Hello World", rng)
        assert out.lower() == "hello world"


class TestAbbreviate:
    def test_no_new_tokens(self, rng):
        out = C.abbreviate("professional gaming laptop", rng)
        for tok, orig in zip(out.split(), "professional gaming laptop".split()):
            assert orig.startswith(tok)

    def test_short_tokens_kept(self, rng):
        assert C.abbreviate("ab cd", rng) == "ab cd"


class TestCorruptValue:
    def test_none_stays_none(self, rng):
        assert C.corrupt_value(None, rng) is None

    def test_null_prob_one_nulls_out(self, rng):
        assert C.corrupt_value("text", rng, null_prob=1.0) is None

    def test_zero_errors_identity(self, rng):
        assert C.corrupt_value("text", rng, n_errors=0) == "text"

    def test_applies_n_errors(self):
        rng = np.random.default_rng(1)
        outs = {C.corrupt_value("hello wonderful world", rng, n_errors=3) for _ in range(20)}
        assert all(o != "hello wonderful world" for o in outs) or len(outs) > 1
