"""Bounded intersection cache for Leapfrog (CacheTrieJoin-lite, [28]).

The dominant cost of Leapfrog is the sorted-set intersections (paper
§II-A). CacheTrieJoin memoizes intersection results so repeated partial
bindings reuse them. We key the cache on the participating relations'
current trie node ranges — two bindings that leave every participant in
the same trie position produce the same intersection. The cache is a
bounded FIFO (the paper notes sizing the cache is itself hard; a simple
bound keeps the baseline honest about memory)."""
from __future__ import annotations

from collections import OrderedDict

import numpy as np

Key = tuple[int, tuple[tuple[int, int, int], ...]]


class IntersectionCache:
    """FIFO-bounded memo table from trie positions to intersection arrays."""

    def __init__(self, max_entries: int = 100_000):
        self.max_entries = max_entries
        self._store: OrderedDict[Key, np.ndarray] = OrderedDict()
        self.hits = 0
        self.misses = 0

    def get(self, key: Key) -> np.ndarray | None:
        arr = self._store.get(key)
        if arr is None:
            self.misses += 1
        else:
            self.hits += 1
        return arr

    def put(self, key: Key, value: np.ndarray) -> None:
        if self.max_entries <= 0:
            return
        if len(self._store) >= self.max_entries:
            self._store.popitem(last=False)
        self._store[key] = value

    def __len__(self) -> int:
        return len(self._store)
