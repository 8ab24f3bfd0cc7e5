"""Offline editable install.

This container has no network and no ``wheel`` package, so every pip
editable-build path fails (``pip install -e .`` needs either network for
the isolated build env or ``wheel`` for the legacy/PEP-660 build). This
script does what an editable install would: it points the interpreter at
``src/`` via a ``.pth`` file. Run once: ``python dev_install.py``.
"""
import pathlib
import site

target = pathlib.Path(site.getsitepackages()[0]) / "repro_dev.pth"
target.write_text(str(pathlib.Path(__file__).resolve().parent / "src") + "\n")
print(f"wrote {target} -> src/ ; `import repro` now works everywhere")
