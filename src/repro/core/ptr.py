"""PTR: Path-Table Representation of sets (paper §5.3).

Tokens are organized in a balanced binary tree of height
``h = ceil(log2 |T|)`` with each token at a leaf; the edge to a left
child is marked 1 and to a right child 0. ``path_t`` is then the
root-to-leaf bit string of token ``t``. The path table doubles it with
its complement (Equation 16):

    PT[t, i] = path_t[i]        for i in [1, h]
    PT[t, i] = 1 - path_t[i-h]  for i in (h, 2h]

and a set's representation is the column-wise sum of its tokens' rows
(Equation 17). Duplicate tokens in multisets add multiple times, so PTR
naturally distinguishes multisets.

Also provided: ``ptr_half`` (first h dims only — the ablation of §7.3)
and ``binary_encoding`` (each *set* gets the binary digits of its index,
token-oblivious — the weak baseline of §7.3).
"""
from __future__ import annotations

from typing import List, Sequence

import numpy as np


def path_height(n_tokens: int) -> int:
    """Tree height ``h = ceil(log2 |T|)`` (at least 1)."""
    return max(1, int(np.ceil(np.log2(max(n_tokens, 2)))))


def path_table(n_tokens: int) -> np.ndarray:
    """The ``|T| x 2h`` path table PT of Equation (16).

    Token ``t`` sits at leaf ``t`` (left-to-right); the edge to a left
    child is 1, so bit ``i`` of the path is the complement of bit ``i``
    of the leaf index written MSB-first.
    """
    h = path_height(n_tokens)
    t = np.arange(n_tokens, dtype=np.int64)
    # MSB-first binary digits of the leaf index; left edge (=1) taken when
    # the index bit is 0.
    bits = (t[:, None] >> np.arange(h - 1, -1, -1)[None, :]) & 1
    path = 1 - bits
    return np.concatenate([path, 1 - path], axis=1).astype(np.int64)


def ptr(sets: Sequence[np.ndarray], n_tokens: int) -> np.ndarray:
    """PTR representations (Equation 17): ``len(sets) x 2h`` matrix.

    Computed directly from token-id bits rather than via a materialized
    ``|T| x 2h`` table — identical result (the table rows ARE the bit
    paths), but usable for multi-million-token universes. Since each
    second-half column is the complement of its first-half column,
    ``rep[h:] = |S| - rep[:h]`` with |S| counting multiset size.
    """
    h = path_height(n_tokens)
    shifts = np.arange(h - 1, -1, -1)
    out = np.zeros((len(sets), 2 * h), dtype=np.float64)
    for i, s in enumerate(sets):
        if not len(s):
            continue
        bits = (s[:, None] >> shifts[None, :]) & 1
        first = (1 - bits).sum(axis=0)
        out[i, :h] = first
        out[i, h:] = len(s) - first
    return out


def ptr_half(sets: Sequence[np.ndarray], n_tokens: int) -> np.ndarray:
    """PTR built on the first half of the path table only (§5.3 ablation)."""
    return ptr(sets, n_tokens)[:, : path_height(n_tokens)]


def binary_encoding(sets: Sequence[np.ndarray], n_tokens: int) -> np.ndarray:
    """Binary Encoding baseline: set ``i`` is the binary digits of ``i``.

    Token-oblivious by construction — two near-identical sets can land
    far apart — which is exactly why §7.3 finds it partitions poorly.
    """
    n = len(sets)
    h = path_height(max(n, 2))
    i = np.arange(n, dtype=np.int64)
    return ((i[:, None] >> np.arange(h - 1, -1, -1)[None, :]) & 1).astype(np.float64)


def represent(
    sets: Sequence[np.ndarray], n_tokens: int, method: str = "ptr"
) -> np.ndarray:
    """Dispatch over the §7.3 representation methods handled locally."""
    if method == "ptr":
        return ptr(sets, n_tokens)
    if method == "ptr-half":
        return ptr_half(sets, n_tokens)
    if method == "binary":
        return binary_encoding(sets, n_tokens)
    raise ValueError(f"unknown representation {method!r}")
