#!/usr/bin/env python3
"""Assemble EXPERIMENTS.md: inject the measured tables captured in
bench_output.txt into EXPERIMENTS.tmpl.md's {{TABLE:<title prefix>}}
placeholders. Rerun after `sbt -batch "bench/test" | tee bench_output.txt`.
"""
import re
import sys

BENCH = "bench_output.txt"
TMPL = "EXPERIMENTS.tmpl.md"
OUT = "EXPERIMENTS.md"


def load_tables(path):
    tables = {}
    title = None
    buf = []
    for line in open(path, encoding="utf-8", errors="replace"):
        line = line.rstrip("\n")
        if line.startswith("### "):
            if title:
                tables[title] = buf
            title = line[4:]
            buf = [line]
        elif title is not None:
            if line.startswith("|"):
                buf.append(line)
            else:
                tables[title] = buf
                title = None
                buf = []
    if title:
        tables[title] = buf
    return tables


def main():
    tables = load_tables(BENCH)
    out = []
    missing = []
    for line in open(TMPL, encoding="utf-8"):
        m = re.match(r"\{\{TABLE:(.+)\}\}", line.strip())
        if not m:
            out.append(line.rstrip("\n"))
            continue
        prefix = m.group(1)
        hits = [t for t in tables if t.startswith(prefix)]
        if not hits:
            missing.append(prefix)
            out.append(f"(missing table: {prefix})")
        else:
            out.append("\n".join(tables[hits[0]]))
    open(OUT, "w", encoding="utf-8").write("\n".join(out) + "\n")
    if missing:
        sys.exit(f"missing tables: {missing}")
    print(f"wrote {OUT} with {len(tables)} captured tables")


if __name__ == "__main__":
    main()
