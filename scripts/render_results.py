#!/usr/bin/env python3
"""Render bench-results/*.tsv into the markdown blocks used by EXPERIMENTS.md.

Usage: python3 scripts/render_results.py
Prints one markdown section per TSV to stdout.
"""
import csv
import glob
import os

DIR = os.path.join(os.path.dirname(__file__), "..", "bench-results")


def render(path: str) -> str:
    with open(path) as fh:
        rows = list(csv.reader(fh, delimiter="\t"))
    header, body = rows[0], rows[1:]
    out = ["| " + " | ".join(header) + " |",
           "|" + "---|" * len(header)]
    for r in body:
        out.append("| " + " | ".join(r) + " |")
    return "\n".join(out)


def main() -> None:
    for path in sorted(glob.glob(os.path.join(DIR, "*.tsv"))):
        name = os.path.basename(path).removesuffix(".tsv")
        print(f"### measured: {name}\n")
        print(render(path))
        print()


if __name__ == "__main__":
    main()
