"""Parameter-settings tests (paper Table 5 encoded in config)."""
import pytest

from repro.config import DEFAULTS, PARAM_GRID, TERConfig


class TestTable5:
    """T5: the paper's parameter grid and bold defaults are encoded."""

    def test_grid_values(self):
        assert PARAM_GRID["alpha"] == [0.1, 0.2, 0.5, 0.8, 0.9]
        assert PARAM_GRID["rho"] == [0.3, 0.4, 0.5, 0.6, 0.7]
        assert PARAM_GRID["xi"] == [0.1, 0.2, 0.3, 0.4, 0.5, 0.8]
        assert PARAM_GRID["w"] == [500, 800, 1000, 2000, 3000]
        assert PARAM_GRID["eta"] == [0.1, 0.2, 0.3, 0.4, 0.5]
        assert PARAM_GRID["m"] == [1, 2, 3]

    def test_defaults_are_bold_values(self):
        cfg = TERConfig()
        for k, v in DEFAULTS.items():
            assert getattr(cfg, k) == v, k

    def test_defaults_in_grid(self):
        for k, v in DEFAULTS.items():
            assert v in PARAM_GRID[k], k


class TestTERConfig:
    def test_gamma(self):
        assert TERConfig(rho=0.5, d=5).gamma == 2.5
        assert TERConfig(rho=0.3, d=5).gamma == pytest.approx(1.5)

    def test_with_(self):
        cfg = TERConfig()
        c2 = cfg.with_(alpha=0.9)
        assert c2.alpha == 0.9 and cfg.alpha == 0.5
        assert c2.w == cfg.w

    def test_frozen(self):
        with pytest.raises(Exception):
            TERConfig().alpha = 0.9
