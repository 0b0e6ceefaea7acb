"""Triangle substrate: minimum-time-span, enumeration, brute-force oracle."""
