#!/usr/bin/env python3
"""Splice the measured tables from bench_output.txt into EXPERIMENTS.md.

Each `<!-- MEASURED:X -->` placeholder is replaced by the corresponding
table (without its `### ` title line) printed by the bench suites.
"""
import re
import sys

BENCH = "bench_output.txt"
EXP = "EXPERIMENTS.md"

SECTION_FOR = {
    "TABLE1": "### Recall for siftLite",
    "TABLE2": "### Build times for siftLite",
    "TABLE3": "### Query times for siftLite",
    "TABLE4": "### Recall for gistLite",
    "TABLE5": "### Build times for gistLite",
    "TABLE6": "### Query times for gistLite",
    "TABLE7": "### Spill comparison on groupsLite",
    "TABLE8": "### Build and query times for real-world",
    "TABLE9": "### Recall for real-world",
}


def tables(text):
    """title-prefix -> list of body lines (the `| ... |` rows)."""
    out = {}
    cur = None
    for line in text.splitlines():
        if line.startswith("### "):
            cur = line
            out[cur] = []
        elif cur is not None and line.startswith("|"):
            out[cur].append(line)
        elif cur is not None and line.strip() == "":
            cur = None
    return out


def main():
    bench = open(BENCH).read()
    tabs = tables(bench)

    def find(prefix):
        for title, body in tabs.items():
            if title.startswith(prefix):
                return "\n".join(body)
        sys.exit(f"section not found in {BENCH}: {prefix}")

    exp = open(EXP).read()
    for key, prefix in SECTION_FOR.items():
        exp = exp.replace(f"<!-- MEASURED:{key} -->", find(prefix))

    learn = []
    for title, body in tabs.items():
        if title.startswith("### Segmenter pre-learning"):
            learn.append(title.replace("### ", "Measured, ") + "\n\n" + "\n".join(body))
    exp = exp.replace("<!-- MEASURED:LEARN -->", "\n\n".join(learn))

    if re.search(r"<!-- MEASURED:", exp):
        sys.exit("unfilled placeholders remain")
    open(EXP, "w").write(exp)
    print("EXPERIMENTS.md filled")


if __name__ == "__main__":
    main()
