"""Attribute schema for the generalized cofactor ring.

The ring operates over a *fixed, ordered* list of attributes, each marked
continuous or categorical (the paper assumes categoricals are int-encoded;
any hashable scalar works here). All ``Triple`` values, lifting functions,
and dense expansions reference attributes by their index in this schema.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class AttrSchema:
    """Ordered attribute list with continuous/categorical flags.

    ``names`` is the attribute order used for cofactor indices; ``cat`` is a
    parallel tuple of booleans (True = categorical). Join keys and row ids are
    *not* part of the schema — only attributes that participate in cofactor
    aggregates are.
    """

    names: tuple[str, ...]
    cat: tuple[bool, ...]
    _index: dict[str, int] = field(init=False, repr=False, compare=False)

    def __post_init__(self) -> None:
        if len(self.names) != len(self.cat):
            raise ValueError("names and cat must be parallel")
        if len(set(self.names)) != len(self.names):
            raise ValueError(f"duplicate attribute names: {self.names}")
        object.__setattr__(self, "_index", {n: i for i, n in enumerate(self.names)})

    @classmethod
    def of(cls, continuous: list[str] | tuple[str, ...] = (),
           categorical: list[str] | tuple[str, ...] = ()) -> "AttrSchema":
        """Build a schema with continuous attributes first, then categorical."""
        names = tuple(continuous) + tuple(categorical)
        return cls(names, (False,) * len(continuous) + (True,) * len(categorical))

    @property
    def m(self) -> int:
        """Number of attributes (the cofactor matrix is m x m)."""
        return len(self.names)

    def index(self, name: str) -> int:
        return self._index[name]

    def is_cat(self, i: int | str) -> bool:
        if isinstance(i, str):
            i = self._index[i]
        return self.cat[i]

    @property
    def continuous(self) -> tuple[str, ...]:
        return tuple(n for n, c in zip(self.names, self.cat) if not c)

    @property
    def categorical(self) -> tuple[str, ...]:
        return tuple(n for n, c in zip(self.names, self.cat) if c)

    def subset(self, names: list[str] | tuple[str, ...]) -> "AttrSchema":
        """Schema over a subset of attributes, preserving this schema's order.

        Used by factorized evaluation: each table lifts only its own
        attributes, but indices must live in the *global* attribute space, so
        per-table lifts take the global schema plus an attribute subset
        instead of calling this.
        """
        keep = [n for n in self.names if n in set(names)]
        return AttrSchema(tuple(keep), tuple(self.cat[self.index(n)] for n in keep))
