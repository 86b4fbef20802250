"""IndexConfig serialization and derived-parameter tests."""
import pytest

from repro.core.config import IndexConfig


def test_defaults_match_paper():
    cfg = IndexConfig()
    assert cfg.sax_segments == 16
    assert cfg.sax_card == 256
    assert cfg.lmax == 80
    assert cfg.eapca_th == 0.25
    assert cfg.sax_th == 0.50
    assert cfg.flush_threshold == 12
    assert cfg.vafile_dims == 16


def test_json_roundtrip():
    cfg = IndexConfig(leaf_size=42, lmax=7, num_partitions=3)
    back = IndexConfig.from_json(cfg.to_json())
    assert back == cfg


def test_scaled_lmax_fraction_aware():
    cfg = IndexConfig(lmax=80)
    assert cfg.scaled_lmax(10) == 2        # tiny tree: minimal approx budget
    assert cfg.scaled_lmax(200) == 10      # 5% of the leaves
    assert cfg.scaled_lmax(10_000) == 80   # capped at the paper's L_max
    assert cfg.scaled_lmax(1) == 1
    assert cfg.scaled_lmax(0) == 1
