#!/usr/bin/env python3
"""Splice the measured tables from bench output into EXPERIMENTS.md.

Usage: python3 scripts/fill_experiments.py [bench_output.txt]

Finds each `== <title> ==` banner in the bench log, collects the markdown
table (and any context line) that follows, and replaces the matching
`<!-- XX -->` placeholder in EXPERIMENTS.md.
"""
import re
import sys

LOG = sys.argv[1] if len(sys.argv) > 1 else "bench_output.txt"

BANNERS = {
    "Table 1": "T1",
    "Figure 1": "F1",
    "Figure 4/7": "F4",
    "Figure 5": "F5",
    "Figure 6/7": "F6",
    "Figure 8": "F8",
}

blocks = {}
lines = [re.sub(r"^\[info\] ", "", l.rstrip("\n")) for l in open(LOG)]
i = 0
while i < len(lines):
    m = re.match(r"== (.+?)[:(]", lines[i])
    if m:
        key = next((v for k, v in BANNERS.items() if lines[i].startswith(f"== {k}")), None)
        if key:
            buf = []
            j = i + 1
            while j < len(lines) and (lines[j].startswith("|") or "control" in lines[j]
                                      or lines[j].strip() == "" and j - i < 3):
                if lines[j].strip():
                    buf.append(lines[j])
                j += 1
            blocks[key] = "\n".join(buf)
            i = j
            continue
    i += 1

exp = open("EXPERIMENTS.md").read()
for key, table in blocks.items():
    exp = exp.replace(f"<!-- {key} -->", table)
open("EXPERIMENTS.md", "w").write(exp)
missing = [k for k in BANNERS.values() if f"<!-- {k} -->" in exp]
print(f"filled {sorted(blocks)}; missing placeholders still present: {missing}")
