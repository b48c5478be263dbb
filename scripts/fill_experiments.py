#!/usr/bin/env python3
"""Splice the measured tables from bench_output.txt into EXPERIMENTS.md.

Each bench suite prints blocks of the form

    == <title> ==
    | header | ... |
    |--------|-----|
    | rows   | ... |
    [optional classes: ... line]

This script extracts them and replaces the MEASURED_* placeholders.
Idempotent only on a template containing the placeholders.
"""
import re
import sys

BENCH = sys.argv[1] if len(sys.argv) > 1 else "bench_output.txt"
EXP = sys.argv[2] if len(sys.argv) > 2 else "EXPERIMENTS.md"

text = open(BENCH, encoding="utf-8", errors="replace").read()

blocks = {}
lines = text.splitlines()
i = 0
while i < len(lines):
    m = re.match(r"^== (.*) ==\s*$", lines[i])
    if m:
        title = m.group(1)
        body = []
        i += 1
        while i < len(lines) and (lines[i].startswith("|") or lines[i].startswith("classes:")):
            body.append(lines[i])
            i += 1
        blocks.setdefault(title, []).append("== " + title + " ==\n" + "\n".join(body))
    else:
        i += 1

def find(prefix):
    out = []
    for title, bs in blocks.items():
        if title.startswith(prefix):
            out.extend(bs[-1:])  # last occurrence of each distinct title
    return "\n\n".join(out) if out else None

mapping = {
    "MEASURED_TABLE1": find("Table I"),
    "MEASURED_FIG7": find("Fig. 7"),
    "MEASURED_FIG9": find("Fig. 9"),
    "MEASURED_FIG10": find("Fig. 10"),
    "MEASURED_FIG11": find("Fig. 11"),
    "MEASURED_FIG12": find("Fig. 12"),
    "MEASURED_FIG13": find("Fig. 13"),
    "MEASURED_FIG14": find("Fig. 14"),
    "MEASURED_FIG8": find("Fig. 8"),
}

exp = open(EXP, encoding="utf-8").read()
missing = []
for key, val in mapping.items():
    if val is None:
        missing.append(key)
        continue
    exp = exp.replace(key, "```\n" + val + "\n```")
open(EXP, "w", encoding="utf-8").write(exp)
print("spliced:", [k for k, v in mapping.items() if v], "missing:", missing)
