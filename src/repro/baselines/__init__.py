"""State-of-the-art competitors reimplemented from scratch:
DSTree*, ParIS+, VA+file, and PSCAN (plus a brute-force test oracle)."""
