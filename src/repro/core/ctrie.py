"""CandidatePrefixTrie (CTrie) — Section IV/V-A.

A token-level prefix-trie forest indexing the seed entity candidates
discovered by Local EMD. Keys are case-insensitive token sequences;
candidates sharing a prefix share a subtree. The scan implements the
paper's occurrence-mining algorithm: an incremental window slides over a
tweet-sentence finding the *longest* subsequences matching registered
candidates, with the paper's two restart rules —

- on a mismatch after a successful (recorded) match, the next window
  starts at the token immediately after the matched subsequence;
- if the window matched nothing, the next window starts immediately to
  the right of the previous window's first token.

The trie is small (one node per distinct candidate token path) and is
broadcast to Spark executors for the distributed mining scan.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.local_emd.base import is_special

__all__ = ["CTrie"]


@dataclass
class _Node:
    children: dict = field(default_factory=dict)
    terminal: bool = False


class CTrie:
    """Prefix-trie forest over lowercase candidate token sequences."""

    def __init__(self, keys: list | None = None):
        self.root = _Node()
        self._n = 0
        for k in keys or []:
            self.insert(k)

    def __len__(self) -> int:
        return self._n

    def insert(self, key: str) -> None:
        """Register candidate ``key`` (lowercase, space-joined tokens)."""
        toks = key.lower().split(" ")
        node = self.root
        for t in toks:
            node = node.children.setdefault(t, _Node())
        if not node.terminal:
            node.terminal = True
            self._n += 1

    def contains(self, key: str) -> bool:
        node = self.root
        for t in key.lower().split(" "):
            node = node.children.get(t)
            if node is None:
                return False
        return node.terminal

    def keys(self) -> list:
        """All registered candidate keys (for state inspection/tests)."""
        out: list = []

        def walk(node: _Node, prefix: list) -> None:
            if node.terminal:
                out.append(" ".join(prefix))
            for tok, child in node.children.items():
                walk(child, prefix + [tok])

        walk(self.root, [])
        return sorted(out)

    def _longest_from(self, lowered: list, i: int) -> int:
        """Length of the longest candidate match starting at ``i`` (0 if
        none). Case folding happened in the caller."""
        node = self.root
        best = 0
        j = i
        while j < len(lowered):
            node = node.children.get(lowered[j])
            if node is None:
                break
            j += 1
            if node.terminal:
                best = j - i
        return best

    def scan(self, tokens: list) -> list:
        """Find all candidate mentions in a sentence.

        Returns ``(start, length, key)`` triples, longest-match greedy
        left-to-right per the paper's window algorithm. Hashtags,
        handles, and URLs never participate in candidate paths.
        """
        lowered = [t.lower() for t in tokens]
        out = []
        i = 0
        n = len(tokens)
        while i < n:
            if is_special(tokens[i]):
                i += 1
                continue
            m = self._longest_from(lowered, i)
            if m > 0:
                out.append((i, m, " ".join(lowered[i : i + m])))
                i += m  # restart after the matched subsequence
            else:
                i += 1  # failed window: restart right of its first token
        return out
