"""Property-based tests (hypothesis) for the CTrie scan invariants."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.ctrie import CTrie

token = st.sampled_from(["a", "b", "c", "d", "aa", "bb"])
sentence = st.lists(token, min_size=0, max_size=12)
candidate = st.lists(token, min_size=1, max_size=3).map(" ".join)
candidates = st.lists(candidate, min_size=1, max_size=6)


@settings(max_examples=200, deadline=None)
@given(candidates, sentence)
def test_scan_matches_are_registered_candidates(keys, toks):
    t = CTrie(keys)
    for start, length, key in t.scan(toks):
        assert t.contains(key)
        assert " ".join(toks[start : start + length]).lower() == key


@settings(max_examples=200, deadline=None)
@given(candidates, sentence)
def test_scan_spans_disjoint_and_ordered(keys, toks):
    t = CTrie(keys)
    spans = t.scan(toks)
    prev_end = -1
    for start, length, _ in spans:
        assert start > prev_end
        assert length >= 1
        assert start + length <= len(toks)
        prev_end = start + length - 1


@settings(max_examples=200, deadline=None)
@given(candidates, sentence)
def test_scan_greedy_longest_from_each_match_start(keys, toks):
    """At each reported match start, no longer registered candidate
    begins there (greedy longest-match property)."""
    t = CTrie(keys)
    lowered = [x.lower() for x in toks]
    for start, length, _ in t.scan(toks):
        longer = t._longest_from(lowered, start)
        assert longer == length


@settings(max_examples=150, deadline=None)
@given(candidates, sentence)
def test_scan_case_insensitive(keys, toks):
    t = CTrie(keys)
    upper = [x.upper() for x in toks]
    assert [(s, l, k) for s, l, k in t.scan(toks)] == [
        (s, l, k) for s, l, k in t.scan(upper)
    ]


@settings(max_examples=150, deadline=None)
@given(candidates)
def test_every_registered_key_findable_in_isolation(keys):
    t = CTrie(keys)
    for key in t.keys():
        toks = key.split(" ")
        found = t.scan(toks)
        # the scan starting at position 0 must cover the whole key
        # (possibly reported as one longer merged candidate is impossible
        # in isolation: the sentence IS the key)
        assert found and found[0][0] == 0
        assert found[0][2] == key or t.contains(found[0][2])


@settings(max_examples=150, deadline=None)
@given(candidates, sentence, sentence)
def test_unigram_occurrences_never_missed_outside_matches(keys, left, right):
    """A registered unigram occurring in the sentence is always inside
    some reported span (it can be absorbed by a longer match but never
    silently skipped)."""
    t = CTrie(keys)
    unigrams = {k for k in t.keys() if " " not in k}
    toks = left + right
    spans = t.scan(toks)
    covered = {i for s, l, _ in spans for i in range(s, s + l)}
    for i, tok in enumerate(toks):
        if tok.lower() in unigrams:
            assert i in covered
