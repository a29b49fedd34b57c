"""Graph substrates: edge-list utilities, synthetic generators, paper toys."""
