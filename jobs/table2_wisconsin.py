"""Reproduce paper Table II: the scalable Wisconsin benchmark schema.

Generates a dataset, prints the attribute specification, and validates
every Table II derivation against the generated data.

Usage: spark-submit jobs/table2_wisconsin.py [n_records]
"""
from __future__ import annotations

import sys

from repro.wisconsin.generator import wisconsin_pdf

SPEC = [
    ("unique1", "0..MAX-1", "unique, random"),
    ("unique2", "0..MAX-1", "unique, sequential"),
    ("two", "0..1", "unique1 mod 2"),
    ("four", "0..3", "unique1 mod 4"),
    ("ten", "0..9", "unique1 mod 10"),
    ("twenty", "0..19", "unique1 mod 20"),
    ("onePercent", "0..99", "unique1 mod 100"),
    ("tenPercent", "0..9", "unique1 mod 10 (+NULLs)"),
    ("twentyPercent", "0..4", "unique1 mod 5"),
    ("fiftyPercent", "0..1", "unique1 mod 2"),
    ("unique3", "0..MAX-1", "unique1"),
    ("evenOnePercent", "0,2,..,198", "onePercent*2"),
    ("oddOnePercent", "1,3,..,199", "(onePercent*2)+1"),
    ("stringu1", "per template", "derived from unique1"),
    ("stringu2", "per template", "derived from unique2"),
    ("string4", "per template", "cyclic: A, H, O, V"),
]


def main(spark=None, n: int = 5_000) -> None:
    pdf = wisconsin_pdf(n, seed=42)
    print(f"TABLE II — Scalable Wisconsin benchmark attributes (n={n})")
    print(f"{'attribute':<16} {'domain':<14} {'value':<24} validated")
    checks = {
        "unique1": sorted(pdf.unique1) == list(range(n)),
        "unique2": (pdf.unique2 == range(n)).all(),
        "two": (pdf.two == pdf.unique1 % 2).all(),
        "four": (pdf.four == pdf.unique1 % 4).all(),
        "ten": (pdf.ten == pdf.unique1 % 10).all(),
        "twenty": (pdf.twenty == pdf.unique1 % 20).all(),
        "onePercent": (pdf.onePercent == pdf.unique1 % 100).all(),
        "tenPercent": (
            pdf.tenPercent.dropna()
            == (pdf.unique1 % 10)[pdf.tenPercent.notna()]
        ).all(),
        "twentyPercent": (pdf.twentyPercent == pdf.unique1 % 5).all(),
        "fiftyPercent": (pdf.fiftyPercent == pdf.unique1 % 2).all(),
        "unique3": (pdf.unique3 == pdf.unique1).all(),
        "evenOnePercent": (pdf.evenOnePercent == pdf.onePercent * 2).all(),
        "oddOnePercent": (pdf.oddOnePercent == pdf.onePercent * 2 + 1).all(),
        "stringu1": (pdf.stringu1.str.len() == 52).all() and pdf.stringu1.is_unique,
        "stringu2": (pdf.stringu2.str.len() == 52).all() and pdf.stringu2.is_unique,
        "string4": set(pdf.string4.str[0]) == set("AHOV"),
    }
    for attr, domain, value in SPEC:
        print(f"{attr:<16} {domain:<14} {value:<24} {'OK' if checks[attr] else 'FAIL'}")
    rate = pdf.tenPercent.isna().mean()
    print(f"\ninjected missing values in tenPercent: {rate:.1%} of records")
    assert all(checks.values()), "Table II validation failed"


if __name__ == "__main__":
    main(n=int(sys.argv[1]) if len(sys.argv) > 1 else 5_000)
