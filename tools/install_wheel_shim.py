"""Install the offline ``wheel`` shim into the current site-packages.

The container has no package index, and setuptools' PEP 660 editable
install (``pip install -e .``) needs the ``wheel`` package.  This script
copies ``tools/wheel_shim/wheel`` into site-packages and writes the
dist-info (including the ``distutils.commands`` entry point that lets
setuptools discover ``bdist_wheel``).  Idempotent; it refuses to touch a
real ``wheel`` installation.
"""
from __future__ import annotations

import os
import shutil
import site
import sys

SHIM = os.path.join(os.path.dirname(os.path.abspath(__file__)), "wheel_shim", "wheel")


def main() -> None:
    sp = site.getsitepackages()[0]
    target = os.path.join(sp, "wheel")
    if os.path.exists(target):
        marker = os.path.join(target, "__init__.py")
        with open(marker, encoding="utf-8") as f:
            if "offline-shim" not in f.read():
                print("real wheel package already installed; not touching it")
                return
        shutil.rmtree(target)
    shutil.copytree(SHIM, target)
    di = os.path.join(sp, "wheel-0.0.0+offline.shim.dist-info")
    os.makedirs(di, exist_ok=True)
    with open(os.path.join(di, "METADATA"), "w", encoding="utf-8") as f:
        f.write(
            "Metadata-Version: 2.1\nName: wheel\nVersion: 0.0.0+offline.shim\n"
            "Summary: offline bdist_wheel shim\n"
        )
    with open(os.path.join(di, "entry_points.txt"), "w", encoding="utf-8") as f:
        f.write("[distutils.commands]\nbdist_wheel = wheel.bdist_wheel:bdist_wheel\n")
    with open(os.path.join(di, "RECORD"), "w", encoding="utf-8") as f:
        f.write("")
    print(f"wheel shim installed into {target}")


if __name__ == "__main__":
    sys.exit(main())
