"""Metrics and the experiment harness behind Tables 1-3 and Section 7.5."""
