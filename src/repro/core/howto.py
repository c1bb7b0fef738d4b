"""How-to guide component (paper §4.1, Figure 1 part D).

Clicking the "?" icon on a plot pops up the customization guide for that
plot: every config key it honours, the default, and a copy-pasteable
snippet. The guide's knowledge base is the Config registry itself, so it
can never drift from what the Config Manager accepts.
"""
from __future__ import annotations

import html as _html

from repro.core.config import DEFAULTS

#: plot name → config-key prefixes the plot honours.
PLOT_PREFIXES: dict[str, tuple[str, ...]] = {
    "hist": ("hist",),
    "kde": ("kde", "hist"),
    "qq": ("qq",),
    "box": ("box",),
    "bar": ("bar",),
    "pie": ("pie",),
    "wordfreq": ("wordfreq",),
    "scatter": ("scatter",),
    "hexbin": ("hexbin",),
    "nested": ("nested",),
    "heatmap": ("heatmap",),
    "line": ("line", "hist"),
    "boxnum": ("boxnum",),
    "spectrum": ("spectrum",),
    "correlation": ("correlation", "kendall"),
    "insight": ("insight",),
}


def howto(plot: str) -> dict[str, dict[str, object]]:
    """Customization guide for one plot: ``{key: {default, doc}}``.

    Raises ``KeyError`` with the known plot names for typos — same
    discoverability contract as the Config Manager.
    """
    if plot not in PLOT_PREFIXES:
        raise KeyError(f"unknown plot {plot!r}; known plots: {sorted(PLOT_PREFIXES)}")
    out: dict[str, dict[str, object]] = {}
    for prefix in PLOT_PREFIXES[plot]:
        for key, (default, doc) in DEFAULTS.items():
            if key.startswith(prefix + "."):
                out[key] = {"default": default, "doc": doc}
    return out


def howto_snippet(plot: str) -> str:
    """Copy-pasteable config snippet, e.g. ``{"hist.bins": 50}``."""
    entries = ", ".join(f'"{k}": {v["default"]!r}' for k, v in howto(plot).items())
    return "{" + entries + "}"


def howto_html(plot: str) -> str:
    """HTML fragment embedded next to each panel by the Render module."""
    rows = "".join(
        f"<tr><td><code>{_html.escape(k)}</code></td>"
        f"<td>{_html.escape(repr(v['default']))}</td>"
        f"<td>{_html.escape(str(v['doc']))}</td></tr>"
        for k, v in howto(plot).items()
    )
    return (
        f'<table class="howto-table"><tr><th>key</th><th>default</th><th>doc</th></tr>{rows}</table>'
        f"<p>Usage: <code>plot(df, ..., config={_html.escape(howto_snippet(plot))})</code></p>"
    )
