"""Lines-of-code metric for Table III.

The paper compares the user-facing implementation effort of each complex
task: the BLEND plan definition (5–8 LOC) vs the application glue needed
to federate stand-alone systems (49–135 LOC). We count the executable
body lines of the actual functions in this package — no blanks, comments
or docstrings, and not the ``def`` line.
"""
from __future__ import annotations

import inspect
import io
import tokenize


def loc(fn) -> int:
    """Count executable source lines of a function body."""
    src = inspect.getsource(fn)
    # drop decorators + def line(s)
    lines = src.splitlines()
    start = 0
    for i, line in enumerate(lines):
        s = line.strip()
        if s.startswith("def ") or s.startswith("async def "):
            start = i
            break
    # find end of the signature (line whose trimmed form ends with ':')
    while start < len(lines) and not lines[start].rstrip().endswith(":"):
        start += 1
    body = "\n".join(lines[start + 1 :])

    # strip comments/strings via tokenize to find lines with real code
    code_lines: set[int] = set()
    try:
        toks = tokenize.generate_tokens(io.StringIO(body).readline)
        prev_was_colon_block_doc = False
        for tok in toks:
            if tok.type in (
                tokenize.COMMENT,
                tokenize.NL,
                tokenize.NEWLINE,
                tokenize.INDENT,
                tokenize.DEDENT,
                tokenize.ENDMARKER,
            ):
                continue
            code_lines.update(range(tok.start[0], tok.end[0] + 1))
    except tokenize.TokenizeError:  # pragma: no cover - defensive
        pass

    # remove docstring lines: first statement if it is a bare string
    stripped = [l.strip() for l in body.splitlines()]
    first_code = next((i for i, s in enumerate(stripped) if s), None)
    if first_code is not None and stripped[first_code].startswith(('"""', "'''", '"', "'")):
        quote = '"""' if '"""' in stripped[first_code] else "'''"
        end = first_code
        if stripped[first_code].count(quote) < 2:
            for j in range(first_code + 1, len(stripped)):
                if quote in stripped[j]:
                    end = j
                    break
        for i in range(first_code, end + 1):
            code_lines.discard(i + 1)
    return len(code_lines)
