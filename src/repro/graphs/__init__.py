"""Graph substrates: generators, CSR representation, orientations."""
