"""Intermediates container (paper §4.2.2) and the task result wrapper.

The Compute module produces ``Intermediates`` — every number needed to
draw the task's visualizations, and nothing distributed: all values are
plain Python/numpy/pandas. The Render module consumes them; the paper
explicitly exposes intermediates so users can re-plot with their own
library, so ``EDAResult.intermediates`` is public API here too.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Iterator


@dataclass
class Intermediates:
    """Named bag of computed results for one EDA task.

    Keys are visualization/stat names (``"hist"``, ``"stats"``, ``"qq"``);
    values are small pandas frames, dicts, or scalars. Attribute-style and
    item-style access both work.
    """

    task: str
    data: dict[str, Any] = field(default_factory=dict)

    def __getitem__(self, key: str) -> Any:
        return self.data[key]

    def __setitem__(self, key: str, value: Any) -> None:
        self.data[key] = value

    def __contains__(self, key: str) -> bool:
        return key in self.data

    def __iter__(self) -> Iterator[str]:
        return iter(self.data)

    def keys(self):
        return self.data.keys()

    def get(self, key: str, default: Any = None) -> Any:
        return self.data.get(key, default)


@dataclass
class Insight:
    """One auto-detected data fact above its threshold (paper §4.2.2)."""

    kind: str
    subject: str  # column, column pair, or "dataset"
    value: float
    threshold: float
    message: str


@dataclass
class EDAResult:
    """What a ``plot*`` call returns: intermediates + insights + HTML."""

    task: str
    intermediates: Intermediates
    insights: list[Insight] = field(default_factory=list)
    html: str = ""

    def _repr_html_(self) -> str:  # Jupyter front-end hook (paper §4.1)
        return self.html

    def show(self) -> str:
        return self.html
