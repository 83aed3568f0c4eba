#!/usr/bin/env python
"""Splice the latest results/*.txt tables into EXPERIMENTS.md.

Each ``<!-- RESULTS:name -->`` marker is replaced by a fenced block
containing ``results/name.txt`` (the marker is kept so the script is
idempotent and can refresh numbers after a new benchmark run).
"""
import re
import sys

PATH = "EXPERIMENTS.md"


def main() -> int:
    text = open(PATH).read()

    def repl(m: re.Match) -> str:
        name = m.group(1)
        try:
            body = open(f"results/{name}.txt").read().rstrip()
        except FileNotFoundError:
            return m.group(0)
        return f"<!-- RESULTS:{name} -->\n```\n{body}\n```"

    # Drop any previously spliced block following a marker, then re-splice.
    text = re.sub(
        r"<!-- RESULTS:([\w-]+) -->\n```\n.*?\n```",
        lambda m: f"<!-- RESULTS:{m.group(1)} -->",
        text,
        flags=re.S,
    )
    new = re.sub(r"<!-- RESULTS:([\w-]+) -->", repl, text)
    open(PATH, "w").write(new)
    missing = re.findall(r"<!-- RESULTS:([\w-]+) -->\n(?!```)", new)
    if missing:
        print(f"markers without results files: {missing}")
    return 0


if __name__ == "__main__":
    sys.exit(main())
