"""Pattern type: a sequence of tokens from the generalization hierarchy.

A :class:`Pattern` is the unit the whole system trades in — index keys,
FMDV hypotheses, validation rules.  It has

- a **canonical string form** (``<digit>{2}/<digit>+ <letter>{2}`` …)
  that round-trips through :func:`parse_pattern` — this is the key used
  in the Spark index DataFrame,
- an anchored **compiled regex** for matching values.

Token kinds (paper Figure 4, restricted as documented in DESIGN.md §2):

=============  ===========================  =======================
canonical       meaning                      regex
=============  ===========================  =======================
literal text    ``Const(s)``                 ``re.escape(s)``
``<digit>{k}``  exactly k digits             ``[0-9]{k}``
``<digit>+``    one or more digits           ``[0-9]+``
``<letter>{k}`` exactly k letters            ``[A-Za-z]{k}``
``<letter>+``   one or more letters          ``[A-Za-z]+``
``<alnum>{k}``  exactly k letters/digits     ``[A-Za-z0-9]{k}``
``<alnum>+``    one or more letters/digits   ``[A-Za-z0-9]+``
``<sym>{k}``    exactly k symbol chars       ``[^A-Za-z0-9]{k}``
``<sym>+``      one or more symbol chars     ``[^A-Za-z0-9]+``
``<num>``       number incl. floating point  ``-?[0-9]+(\\.[0-9]+)?``
=============  ===========================  =======================

Constants containing ``<`` or ``\\`` are escaped as ``\\<`` / ``\\\\``
in the canonical form so parsing is unambiguous.
"""
from __future__ import annotations

import re
from dataclasses import dataclass
from functools import lru_cache
from typing import Iterable, Optional, Tuple

from repro.patterns.tokens import ALNUM, DIGIT, LETTER, SYMBOL

#: token kind markers
CONST = "CONST"
CLASS = "CLASS"
NUM = "NUM"

_CLASS_NAMES = {DIGIT: "digit", LETTER: "letter", ALNUM: "alnum", SYMBOL: "sym"}
_NAME_CLASSES = {v: k for k, v in _CLASS_NAMES.items()}
_CLASS_REGEX = {
    DIGIT: "[0-9]",
    LETTER: "[A-Za-z]",
    ALNUM: "[A-Za-z0-9]",
    SYMBOL: "[^A-Za-z0-9]",
}


@dataclass(frozen=True)
class Token:
    """One pattern token.

    ``kind`` is CONST / CLASS / NUM.  For CONST, ``text`` holds the
    literal.  For CLASS, ``cls`` is one of D/L/A/S and ``length`` is the
    exact length or ``None`` for "+" (one-or-more).
    """

    kind: str
    text: str = ""
    cls: str = ""
    length: Optional[int] = None

    # --- constructors -------------------------------------------------
    @staticmethod
    def const(text: str) -> "Token":
        return Token(CONST, text=text)

    @staticmethod
    def of(cls: str, length: Optional[int] = None) -> "Token":
        assert cls in _CLASS_NAMES, cls
        return Token(CLASS, cls=cls, length=length)

    @staticmethod
    def num() -> "Token":
        return Token(NUM)

    # --- rendering ----------------------------------------------------
    def canonical(self) -> str:
        if self.kind == CONST:
            return self.text.replace("\\", "\\\\").replace("<", "\\<")
        if self.kind == NUM:
            return "<num>"
        name = _CLASS_NAMES[self.cls]
        suffix = "+" if self.length is None else "{%d}" % self.length
        return f"<{name}>{suffix}"

    def regex(self) -> str:
        if self.kind == CONST:
            return re.escape(self.text)
        if self.kind == NUM:
            return r"-?[0-9]+(?:\.[0-9]+)?"
        base = _CLASS_REGEX[self.cls]
        return base + ("+" if self.length is None else "{%d}" % self.length)

    def __str__(self) -> str:  # pragma: no cover - debugging aid
        return self.canonical()


@dataclass(frozen=True)
class Pattern:
    """An immutable sequence of tokens; hashable, usable as a dict key."""

    tokens: Tuple[Token, ...]

    @staticmethod
    def of(tokens: Iterable[Token]) -> "Pattern":
        # Merge adjacent constants so token structure is canonical:
        # Const("/") + Const("m") ≡ Const("/m"), and Pattern equality
        # coincides with canonical-string equality.
        merged: list = []
        for t in tokens:
            if t.kind == CONST and merged and merged[-1].kind == CONST:
                merged[-1] = Token.const(merged[-1].text + t.text)
            else:
                merged.append(t)
        return Pattern(tuple(merged))

    def canonical(self) -> str:
        return "".join(t.canonical() for t in self.tokens)

    def regex(self) -> str:
        return "".join(t.regex() for t in self.tokens)

    def matches(self, value: str) -> bool:
        return _compiled(self.canonical()).fullmatch(value) is not None

    def concat(self, other: "Pattern") -> "Pattern":
        return Pattern(self.tokens + other.tokens)

    def __len__(self) -> int:
        return len(self.tokens)

    def __str__(self) -> str:  # pragma: no cover - debugging aid
        return self.canonical()


@lru_cache(maxsize=65536)
def _compiled(canonical: str) -> "re.Pattern":
    """Compile (and cache) the anchored regex for a canonical pattern."""
    return re.compile(parse_pattern(canonical).regex())


def compile_canonical(canonical: str) -> "re.Pattern":
    """Public accessor for the compiled-regex cache (used by rules)."""
    return _compiled(canonical)


_TOKEN_RE = re.compile(r"<(digit|letter|alnum|sym|num)>(\{(\d+)\}|\+)?")


def parse_pattern(s: str) -> Pattern:
    """Inverse of :meth:`Pattern.canonical` (round-trips exactly)."""
    tokens = []
    buf = []  # pending constant characters

    def flush():
        if buf:
            tokens.append(Token.const("".join(buf)))
            buf.clear()

    i = 0
    n = len(s)
    while i < n:
        ch = s[i]
        if ch == "\\" and i + 1 < n:
            buf.append(s[i + 1])
            i += 2
            continue
        if ch == "<":
            m = _TOKEN_RE.match(s, i)
            if m:
                flush()
                name = m.group(1)
                if name == "num":
                    tokens.append(Token.num())
                else:
                    length = int(m.group(3)) if m.group(3) else None
                    if m.group(2) is None:
                        raise ValueError(f"token {name} missing quantifier in {s!r}")
                    tokens.append(Token.of(_NAME_CLASSES[name], length))
                i = m.end()
                continue
        buf.append(ch)
        i += 1
    flush()
    return Pattern.of(tokens)
