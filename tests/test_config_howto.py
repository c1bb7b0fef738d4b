"""Unit tests for the Config Manager and the how-to guide."""
import pytest

from repro.core.config import DEFAULTS, Config
from repro.core.howto import PLOT_PREFIXES, howto, howto_html, howto_snippet


def test_defaults_resolved():
    cfg = Config.from_user()
    assert cfg["hist.bins"] == 50
    assert cfg["insight.missing.threshold"] == 0.01
    assert len(cfg.values) == len(DEFAULTS)


def test_user_override():
    cfg = Config.from_user({"hist.bins": 200})
    assert cfg["hist.bins"] == 200
    assert cfg["kde.grid_points"] == DEFAULTS["kde.grid_points"][0]


def test_unknown_key_rejected_with_suggestions():
    with pytest.raises(KeyError) as e:
        Config.from_user({"hist.bin": 10})
    assert "hist.bins" in str(e.value)


def test_unknown_prefix_rejected():
    with pytest.raises(KeyError):
        Config.from_user({"nonsense.key": 1})


def test_group_strips_prefix():
    cfg = Config.from_user({"hist.bins": 99})
    assert cfg.group("hist") == {"bins": 99}


def test_get_with_default():
    cfg = Config.from_user()
    assert cfg.get("does.not.exist", 7) == 7


def test_config_immutable():
    cfg = Config.from_user()
    with pytest.raises(Exception):
        cfg.values = {}


@pytest.mark.parametrize("plot_name", sorted(PLOT_PREFIXES))
def test_howto_every_plot_has_entries(plot_name):
    guide = howto(plot_name)
    assert guide, f"{plot_name} guide is empty"
    for key, entry in guide.items():
        assert key in DEFAULTS
        assert entry["default"] == DEFAULTS[key][0]
        assert entry["doc"] == DEFAULTS[key][1]


def test_howto_unknown_plot():
    with pytest.raises(KeyError) as e:
        howto("histogram")
    assert "hist" in str(e.value)


def test_howto_snippet_copy_pasteable():
    snippet = howto_snippet("hist")
    cfg = Config.from_user(eval(snippet))  # the paper's copy-paste flow
    assert cfg["hist.bins"] == DEFAULTS["hist.bins"][0]


def test_howto_html_contains_keys():
    html = howto_html("kde")
    assert "kde.grid_points" in html and "hist.bins" in html


def test_every_default_reachable_from_some_plot_or_compute():
    covered = set()
    for prefixes in PLOT_PREFIXES.values():
        for p in prefixes:
            covered |= {k for k in DEFAULTS if k.startswith(p + ".")}
    uncovered = {k for k in DEFAULTS if k not in covered}
    # compute/render/insight keys are system-wide, not per-plot
    assert all(
        k.startswith(("compute.", "render.", "insight.", "spectrum.", "line.", "boxnum.", "bar.", "pie."))
        for k in uncovered
    ), uncovered
