"""Synthetic table corpora and query sets (lite stand-ins for DWTC / German Open Data / School)."""
