"""Partially ordered logical timestamps and antichain frontiers.

Timely dataflow timestamps form a partial order; a frontier is an antichain
(Definition 1 of the paper): a set of mutually incomparable timestamps such
that every message still in flight is in advance of some element.

The engine itself uses integer timestamps (totally ordered, so a frontier is
a single minimum), but the Antichain here supports tuple timestamps under the
product partial order so Definition 1/2 semantics are implemented and tested
in their general form.
"""
from __future__ import annotations

from typing import Iterable, Optional


def less_equal(a, b) -> bool:
    """Partial-order ``a <= b``.

    Ints/floats compare naturally; same-length tuples use the product order
    (``a <= b`` iff every coordinate of ``a`` <= the matching one of ``b``).
    """
    if isinstance(a, tuple) and isinstance(b, tuple):
        if len(a) != len(b):
            raise TypeError(f"incomparable tuple lengths: {a} vs {b}")
        return all(less_equal(x, y) for x, y in zip(a, b))
    return a <= b


def in_advance_of(t, other) -> bool:
    """Definition 2: ``t`` is in advance of a timestamp or an Antichain."""
    if isinstance(other, Antichain):
        return other.less_equal(t)
    return less_equal(other, t)


class Antichain:
    """A set of mutually incomparable timestamps (a frontier).

    ``insert`` keeps the set minimal: an element dominated by (in advance of)
    an existing element is rejected; inserting an element that precedes
    existing elements evicts them.
    """

    def __init__(self, elements: Iterable = ()):  # noqa: D107
        self._elements: list = []
        for e in elements:
            self.insert(e)

    def insert(self, t) -> bool:
        """Insert ``t``; return True if it entered the antichain."""
        for e in self._elements:
            if less_equal(e, t):
                return False
        self._elements = [e for e in self._elements if not less_equal(t, e)]
        self._elements.append(t)
        return True

    def less_equal(self, t) -> bool:
        """True iff some frontier element precedes ``t`` (t may still occur)."""
        return any(less_equal(e, t) for e in self._elements)

    def less_than(self, t) -> bool:
        """True iff some element strictly precedes ``t``."""
        return any(less_equal(e, t) and e != t for e in self._elements)

    def dominates(self, other: "Antichain") -> bool:
        """True iff every element of ``other`` is in advance of this frontier."""
        return all(self.less_equal(e) for e in other.elements)

    @property
    def elements(self) -> list:
        return list(self._elements)

    def is_empty(self) -> bool:
        return not self._elements

    def min_int(self) -> Optional[int]:
        """For totally ordered (int) timestamps: the single frontier element."""
        if not self._elements:
            return None
        return min(self._elements)

    def __contains__(self, t) -> bool:
        return t in self._elements

    def __eq__(self, other) -> bool:
        return isinstance(other, Antichain) and sorted(self._elements) == sorted(
            other._elements
        )

    def __repr__(self) -> str:
        return f"Antichain({sorted(self._elements)!r})"


def frontier_min(*candidates: Optional[float]) -> Optional[float]:
    """Minimum of integer frontiers where ``None`` means closed/empty.

    A closed input contributes nothing; if every candidate is closed the
    result is closed (None).
    """
    live = [c for c in candidates if c is not None]
    return min(live) if live else None
