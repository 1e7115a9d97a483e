"""cloc-style line counting for Table 5 (engineering effort).

Counts source lines excluding blanks, ``#`` comments, and docstrings
(cloc treats Python docstrings as comments), using the tokenizer so
multi-line strings used as *values* still count.
"""
from __future__ import annotations

import io
import tokenize


def count_source_lines(path: str) -> int:
    """Non-blank, non-comment, non-docstring source lines in a file."""
    with open(path, "r") as f:
        src = f.read()
    code_lines: set[int] = set()
    prev_toktype = tokenize.INDENT
    for tok in tokenize.generate_tokens(io.StringIO(src).readline):
        ttype, _, start, end, _ = tok
        if ttype in (
            tokenize.COMMENT, tokenize.NL, tokenize.NEWLINE,
            tokenize.INDENT, tokenize.DEDENT, tokenize.ENDMARKER,
        ):
            continue
        if ttype == tokenize.STRING and prev_toktype in (
            tokenize.INDENT, tokenize.NEWLINE, tokenize.NL,
        ):
            prev_toktype = ttype
            continue  # docstring
        prev_toktype = ttype
        for line in range(start[0], end[0] + 1):
            code_lines.add(line)
    return len(code_lines)


def count_files(paths: list[str]) -> int:
    return sum(count_source_lines(p) for p in paths)
