"""Named algorithm registries (DIALITE's extensibility backbone).

Sec. 3.2 demonstrates users plugging in new discovery algorithms,
integration operators and analyses; a registry per stage is the simple
mechanism behind that: register under a name, look up by name, list for
the UI. Registration rejects silent overwrites unless explicitly asked.
"""
from __future__ import annotations

from typing import Generic, Iterator, TypeVar

T = TypeVar("T")


class Registry(Generic[T]):
    """A small insertion-ordered name -> implementation map."""

    def __init__(self, kind: str):
        self._kind = kind
        self._items: dict[str, T] = {}

    def register(self, name: str, item: T, *, replace: bool = False) -> T:
        if not name:
            raise ValueError(f"{self._kind}: empty name")
        if name in self._items and not replace:
            raise ValueError(
                f"{self._kind} '{name}' already registered "
                "(pass replace=True to override)"
            )
        self._items[name] = item
        return item

    def get(self, name: str) -> T:
        try:
            return self._items[name]
        except KeyError:
            raise KeyError(
                f"unknown {self._kind} '{name}'; available: {self.names()}"
            ) from None

    def unregister(self, name: str) -> None:
        self._items.pop(name, None)

    def names(self) -> list[str]:
        return list(self._items)

    def __contains__(self, name: str) -> bool:
        return name in self._items

    def __iter__(self) -> Iterator[tuple[str, T]]:
        return iter(self._items.items())

    def __len__(self) -> int:
        return len(self._items)
