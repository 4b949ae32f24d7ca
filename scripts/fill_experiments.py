#!/usr/bin/env python3
"""Splice the measured tables from bench_output.txt into EXPERIMENTS.md.

Each `<!-- MEASURED-TABLE-X -->` placeholder is replaced by the matching
`## Table X` section of the benchmark output (markdown passes through).
Rerun after `sbt "bench/test" 2>&1 | tee bench_output.txt`.
"""
import re
import sys

BENCH = "bench_output.txt"
EXP = "EXPERIMENTS.md"

out_lines = []
with open(BENCH, encoding="utf-8", errors="replace") as f:
    for line in f:
        line = line.rstrip("\n")
        if line.startswith("[info] ") or line.startswith("[error] "):
            continue
        out_lines.append(line)
text = "\n".join(out_lines)

sections = {}
pat = re.compile(r"^## (Table [IV]+) ", re.M)
marks = list(pat.finditer(text))
for i, m in enumerate(marks):
    end = marks[i + 1].start() if i + 1 < len(marks) else len(text)
    body = text[m.start():end].strip()
    # Drop any trailing non-table noise lines.
    body = "\n".join(l for l in body.splitlines()
                     if not l.startswith("Run completed") and not l.startswith("Total "))
    sections[m.group(1)] = body

roman = {"I": "Table I", "II": "Table II", "III": "Table III", "IV": "Table IV", "V": "Table V"}
with open(EXP, encoding="utf-8") as f:
    exp = f.read()
for key, title in roman.items():
    marker = f"<!-- MEASURED-TABLE-{key} -->"
    if marker in exp and title in sections:
        exp = exp.replace(marker, sections[title])
        print(f"filled {title}")
    elif marker in exp:
        print(f"WARNING: no bench section found for {title}", file=sys.stderr)
with open(EXP, "w", encoding="utf-8") as f:
    f.write(exp)
