"""Shared CLI plumbing for the job entrypoints (spark-submit compatible)."""
from __future__ import annotations

import argparse


def parse_args(description: str) -> argparse.Namespace:
    from repro.harness import BENCH_SF

    p = argparse.ArgumentParser(description=description)
    p.add_argument("--sf", type=float, default=BENCH_SF, help="scale factor")
    p.add_argument("--datasets", nargs="*", default=None, help="dataset subset")
    return p.parse_args()
