"""Six-way syntactic capitalization embedding (Section V-B-1).

For non-deep Local EMD systems, each candidate mention occurrence is
encoded by which of six syntactic presentations it exhibits; pooling the
one-hot encodings over all of a candidate's mentions yields its global
syntactic distribution — entities concentrate on proper/full
capitalization, common-word false positives on lowercase/sentence-start.
"""
from __future__ import annotations

import numpy as np

from repro.local_emd.base import sentence_nondiscriminative

__all__ = [
    "CAT_PROPER",
    "CAT_SENT_START",
    "CAT_SUBSTRING",
    "CAT_FULL_CAPS",
    "CAT_NO_CAPS",
    "CAT_NONDISC",
    "N_CATEGORIES",
    "mention_category",
    "one_hot",
]

CAT_PROPER = 0  # (1) first char of every candidate token capitalized
CAT_SENT_START = 1  # (2) unigram capitalized at start of sentence
CAT_SUBSTRING = 2  # (3) only a proper substring of a multigram capitalized
CAT_FULL_CAPS = 3  # (4) entire string capitalized ('UN', 'UK')
CAT_NO_CAPS = 4  # (5) entire string lowercase
CAT_NONDISC = 5  # (6) sentence casing carries no information
N_CATEGORIES = 6


def mention_category(tokens: list, start: int, length: int) -> int:
    """Classify the mention at ``tokens[start:start+length]``."""
    if sentence_nondiscriminative(tokens):
        return CAT_NONDISC
    span = tokens[start : start + length]
    cap_initial = [len(t) > 0 and t[0].isupper() for t in span]
    if all(len(t) > 1 and t.isupper() for t in span):
        return CAT_FULL_CAPS
    if all(t.islower() for t in span):
        return CAT_NO_CAPS
    if length == 1:
        return CAT_SENT_START if start == 0 else CAT_PROPER
    if all(cap_initial):
        return CAT_PROPER
    if any(cap_initial):
        return CAT_SUBSTRING
    # mixed internal casing with no capitalized token: treat as lowercase
    return CAT_NO_CAPS


def one_hot(category: int) -> np.ndarray:
    v = np.zeros(N_CATEGORIES, dtype=np.float32)
    v[category] = 1.0
    return v
