"""Reproduction of FreeBS/FreeRS (Wang et al., ICDE 2019).

Layout: ``repro.core`` — the paper's contribution (FreeBS/FreeRS);
``repro.baselines`` — LPC, HLL/HLL++, CSE, vHLL; ``repro.streaming`` —
Structured Streaming stateful implementations; ``repro.analysis`` —
metrics and error theory; ``repro.datasets`` — synthetic stand-ins for
the paper's datasets; ``repro.hashing`` — the shared hash substrate.
"""
