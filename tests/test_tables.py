"""Tests for the table renderer and the cached grid sweep machinery."""
import json
import math

import pytest

from repro.eval.harness import CellResult
from repro.eval.tables import (
    cells_by_key,
    render_metric_table,
    run_full_grid,
    write_table,
)


def cell(ds, algo, k, gain=0.5, note=""):
    return CellResult(
        dataset=ds, algorithm=algo, k=k, gain=gain, recall=gain / 2,
        seconds=1.0, memory_bytes=1024, note=note,
    )


class TestRendering:
    def test_cells_by_key(self):
        c = cell("reuters", "basso", 4)
        assert cells_by_key([c])[(4, "reuters", "basso")] is c

    def test_render_basic(self):
        cells = [cell("a", "alg", 4, gain=0.1234)]
        out = render_metric_table(
            cells, "gain", datasets=("a",), k_grid=(4,), algorithms=("alg",)
        )
        assert "| 4 | alg | 0.1234 |" in out

    def test_render_missing_cell(self):
        out = render_metric_table(
            [], "gain", datasets=("a",), k_grid=(4,), algorithms=("alg",)
        )
        assert "?" in out

    def test_render_oom_cell(self):
        cells = [cell("a", "basso", 4, gain=float("nan"), note="oom")]
        out = render_metric_table(
            cells, "gain", datasets=("a",), k_grid=(4,), algorithms=("basso",)
        )
        assert "—" in out

    def test_render_custom_fmt(self):
        cells = [cell("a", "alg", 4, gain=0.5)]
        out = render_metric_table(
            cells, "seconds", datasets=("a",), k_grid=(4,),
            algorithms=("alg",), fmt=lambda v: f"{v:.1f}",
        )
        assert "| 4 | alg | 1.0 |" in out

    def test_write_table(self, tmp_path, capsys):
        p = str(tmp_path / "t.md")
        write_table(p, "Title", "| a |")
        content = open(p).read()
        assert content.startswith("# Title")
        assert "| a |" in content


class TestGridCache:
    def test_small_grid_runs_and_caches(self, tmp_path):
        cache = str(tmp_path / "cells.json")
        cells = run_full_grid(
            None,
            cache_path=cache,
            datasets=("reuters",),
            k_grid=(4,),
            algorithms=("rs-dhillon",),
            verbose=False,
        )
        assert len(cells) == 1
        assert cells[0].ok
        # second call reads the cache (no spark, no work)
        again = run_full_grid(None, cache_path=cache, verbose=False)
        assert again[0].gain == cells[0].gain

    def test_cache_roundtrips_nan(self, tmp_path):
        cache = str(tmp_path / "cells.json")
        run_full_grid(
            None, cache_path=cache, datasets=("wiki",), k_grid=(4,),
            algorithms=("basso",), verbose=False,
        )
        with open(cache) as f:
            raw = json.load(f)
        assert raw[0]["note"] == "oom"
        cells = run_full_grid(None, cache_path=cache, verbose=False)
        assert math.isnan(cells[0].gain)
