"""Graph data substrate: synthetic generators and graph statistics."""
