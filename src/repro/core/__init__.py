"""The paper's contribution: XASH, super keys, and the MATE discovery dataflow."""
