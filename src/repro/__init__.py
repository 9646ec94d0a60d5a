"""Reproduction of "Through the Fairness Lens" (VLDB 2023).

Subpackages:

* ``repro.core``     — the paper's contribution: fairness audit framework.
* ``repro.text``     — string similarity + simulated-LM embedding substrate.
* ``repro.features`` — Magellan-style automatic feature generation.
* ``repro.matchers`` — the 13 entity matchers evaluated by the paper.
* ``repro.em_data``  — synthetic generators for the 8 evaluation datasets.
* ``repro.harness``  — per-table builders (Tables 4, 5, 6, 7, 9).
"""
