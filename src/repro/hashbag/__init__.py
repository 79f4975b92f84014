"""Parallel hash bag substrate (paper Sec. 2)."""

from repro.hashbag.hashbag import HashBag  # noqa: F401
