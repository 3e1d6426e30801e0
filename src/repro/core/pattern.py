"""Pattern model (paper Definition 2.2) and search-tree children (Def. 4.1).

A *pattern* is a conjunction of attribute/value pairs. We represent it as a
tuple of ``(attr_index, value)`` pairs sorted by attribute index, where the
index refers to the dataset's ordered list of pattern attributes and values
are strings (all pattern attributes are categorical/bucketized). Tuples are
hashable, orderable and cheap — the search algorithms keep millions of them.
"""
from __future__ import annotations

from typing import Iterable, Iterator, Sequence

#: A pattern: ``((attr_idx, value), ...)`` sorted ascending by ``attr_idx``.
Pattern = tuple[tuple[int, str], ...]

#: The most general (empty) pattern — satisfied by every tuple.
EMPTY: Pattern = ()


def attr_indices(p: Pattern) -> tuple[int, ...]:
    """The sorted attribute indices referenced by ``p`` (``Attr(p)``)."""
    return tuple(a for a, _ in p)


def values(p: Pattern) -> tuple[str, ...]:
    """The value assignments of ``p`` in attribute-index order."""
    return tuple(v for _, v in p)


def max_index(p: Pattern) -> int:
    """``idx(Attr(p))`` of Definition 4.1; ``-1`` for the empty pattern."""
    return p[-1][0] if p else -1


def satisfies(row: Sequence[str], p: Pattern) -> bool:
    """True iff a tuple (as a value list indexed by attribute index)
    satisfies ``p``, i.e. matches every pair of ``p``."""
    return all(row[a] == v for a, v in p)


def is_subpattern(a: Pattern, p: Pattern) -> bool:
    """True iff ``a ⊆ p`` (``a`` is an ancestor of, or equal to, ``p``)."""
    if len(a) > len(p):
        return False
    ps = set(p)
    return all(item in ps for item in a)


def has_ancestor_in(p: Pattern, pool: Iterable[Pattern]) -> bool:
    """True iff some *proper* subpattern of ``p`` is in ``pool``."""
    return any(len(a) < len(p) and is_subpattern(a, p) for a in pool)


def parents(p: Pattern) -> Iterator[Pattern]:
    """All parents of ``p`` in the *pattern graph* (one pair removed)."""
    for i in range(len(p)):
        yield p[:i] + p[i + 1 :]


def tree_parent(p: Pattern) -> Pattern:
    """The unique parent of ``p`` in the *search tree*: ``p`` minus its
    maximal-index pair (Definition 4.1 makes this the only tree edge)."""
    if not p:
        raise ValueError("the empty pattern has no parent")
    return p[:-1]


def children(
    p: Pattern, domains: Sequence[Sequence[str]]
) -> Iterator[Pattern]:
    """Children of ``p`` in the search tree (Definition 4.1): extend ``p``
    with one ``A_j = v`` pair where ``j`` exceeds every index in ``p`` and
    ``v`` ranges over the active domain of ``A_j``."""
    for j in range(max_index(p) + 1, len(domains)):
        for v in domains[j]:
            yield p + ((j, v),)


def pattern_to_str(p: Pattern, attr_names: Sequence[str]) -> str:
    """Human-readable form, e.g. ``{sex=F, address=R}``."""
    if not p:
        return "{}"
    return "{" + ", ".join(f"{attr_names[a]}={v}" for a, v in p) + "}"
