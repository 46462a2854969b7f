"""Tests for the CandidatePrefixTrie and the Section V-A scan."""
import pytest

from repro.core.ctrie import CTrie


class TestInsertContains:
    def test_empty(self):
        t = CTrie()
        assert len(t) == 0
        assert not t.contains("x")

    def test_insert_and_contains(self):
        t = CTrie(["coronavirus"])
        assert len(t) == 1
        assert t.contains("coronavirus")
        assert t.contains("CORONAVIRUS")  # case-insensitive

    def test_multigram(self):
        t = CTrie(["andy beshear"])
        assert t.contains("andy beshear")
        assert not t.contains("andy")

    def test_prefix_and_full_both_registered(self):
        t = CTrie(["andy", "andy beshear"])
        assert len(t) == 2
        assert t.contains("andy") and t.contains("andy beshear")

    def test_duplicate_insert_not_double_counted(self):
        t = CTrie(["us", "us"])
        assert len(t) == 1

    def test_keys_sorted(self):
        t = CTrie(["b", "a c", "a"])
        assert t.keys() == ["a", "a c", "b"]


class TestScan:
    def test_simple_match(self):
        t = CTrie(["coronavirus"])
        out = t.scan(["the", "Coronavirus", "spreads"])
        assert out == [(1, 1, "coronavirus")]

    def test_case_insensitive_match(self):
        t = CTrie(["coronavirus"])
        assert t.scan(["CORONAVIRUS"]) == [(0, 1, "coronavirus")]

    def test_longest_match_wins(self):
        """Partial-extraction correction: with both 'andy' and 'andy
        beshear' registered, the full mention is preferred."""
        t = CTrie(["andy", "andy beshear"])
        out = t.scan(["saw", "Andy", "Beshear", "today"])
        assert out == [(1, 2, "andy beshear")]

    def test_shorter_match_when_long_path_fails(self):
        t = CTrie(["andy", "andy beshear"])
        out = t.scan(["saw", "Andy", "Johnson"])
        assert out == [(1, 1, "andy")]

    def test_multiple_matches(self):
        t = CTrie(["italy", "canada"])
        out = t.scan(["Canada", "rising", "like", "ITALY"])
        assert out == [(0, 1, "canada"), (3, 1, "italy")]

    def test_adjacent_matches(self):
        t = CTrie(["us", "trump"])
        assert t.scan(["Trump", "US"]) == [(0, 1, "trump"), (1, 1, "us")]

    def test_restart_after_match(self):
        """After recording a match the window restarts right after it —
        overlapping matches are not produced."""
        t = CTrie(["a b", "b c"])
        assert t.scan(["a", "b", "c"]) == [(0, 2, "a b")]

    def test_restart_after_failed_window(self):
        """A failed window restarts one token to the right — a match
        hidden behind a failed prefix is still found."""
        t = CTrie(["b c"])
        assert t.scan(["a", "b", "c"]) == [(1, 2, "b c")]

    def test_prefix_of_registered_multigram_not_matched(self):
        t = CTrie(["andy beshear"])
        assert t.scan(["Andy", "arrived"]) == []

    def test_special_tokens_skipped(self):
        t = CTrie(["covid"])
        assert t.scan(["#covid", "covid"]) == [(1, 1, "covid")]

    def test_specials_break_multigram_paths(self):
        t = CTrie(["andy beshear"])
        assert t.scan(["Andy", "#x", "Beshear"]) == []

    def test_no_match_empty(self):
        t = CTrie(["x"])
        assert t.scan(["a", "b"]) == []
        assert t.scan([]) == []

    def test_three_token_candidate(self):
        t = CTrie(["the new deal"])
        assert t.scan(["we", "love", "The", "New", "Deal", "now"]) == [
            (2, 3, "the new deal")
        ]

    def test_interleaved_prefix_families(self):
        t = CTrie(["a", "a b", "a b c"])
        assert t.scan(["a", "b", "c"]) == [(0, 3, "a b c")]
        assert t.scan(["a", "b", "x"]) == [(0, 2, "a b")]
        assert t.scan(["a", "x"]) == [(0, 1, "a")]

    def test_repeated_mentions_all_found(self):
        t = CTrie(["virus"])
        out = t.scan(["virus", "virus", "virus"])
        assert [o[0] for o in out] == [0, 1, 2]
